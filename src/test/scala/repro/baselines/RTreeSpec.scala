package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import repro.index.BruteForce
import repro.series.{SaxParams, Series, SeriesGen}
import repro.storage.DiskModel

class RTreeSpec extends AnyFunSuite {

  private val p = SaxParams(n = 64, w = 8, bits = 6)
  private val data = SeriesGen.dataset("walk", 800, 64, seed = 4)
  private val queries = SeriesGen.queries("walk", 20, 64, seed = 4)

  private def build(mat: Boolean, cap: Int = 40, disk: DiskModel = new DiskModel()) =
    RTreeSTR.build(data, p, cap, 1L << 30, disk, materialized = mat)

  test("index names match the paper's") {
    assert(build(mat = true).name == "R-tree")
    assert(build(mat = false).name == "R-tree+")
  }
  test("STR packing fills all leaves (except possibly the last)") {
    val t = build(mat = true, cap = 40)
    assert(t.leafCount == 20)
    assert(t.avgLeafFill > 0.99)
  }
  test("exact search matches brute force (materialized)") {
    val t = build(mat = true)
    for (q <- queries)
      assert(math.abs(t.exactSearch(q).dist - BruteForce.nn(data, q).dist) < 1e-9)
  }
  test("exact search matches brute force (non-materialized)") {
    val t = build(mat = false)
    for (q <- queries)
      assert(math.abs(t.exactSearch(q).dist - BruteForce.nn(data, q).dist) < 1e-9)
  }
  test("approximate search returns a valid series and true distance") {
    val t = build(mat = true)
    for (q <- queries.take(5)) {
      val r = t.approxSearch(q)
      assert(r.id >= 0 && math.abs(r.dist - Series.euclidean(data(r.id.toInt), q)) < 1e-9)
    }
  }
  test("exact search prunes: visits fewer records than a full scan") {
    val t = build(mat = true)
    val avg = queries.map(t.exactSearch(_).visitedRecords.toDouble).sum / queries.length
    assert(avg < 800)
  }
  test("STR construction charges one sort per dimension (O(N·D))") {
    val dR = new DiskModel(); val dC = new DiskModel()
    // Force spilling so sort passes show up in the I/O accounting.
    RTreeSTR.build(data, p, 40, 64L * 1024, dR, materialized = true)
    repro.core.CoconutTree.bulkLoad(data, p, 40, 64L * 1024, dC, materialized = true)
    assert(dR.blocksWritten > dC.blocksWritten * 2,
      s"R-tree (${dR.blocksWritten} blk) should sort ~w times vs Coconut's once (${dC.blocksWritten} blk)")
  }
  test("STR groups similar series into the same leaf (locality)") {
    val t = build(mat = true, cap = 40)
    // Average intra-leaf distance must be well below the global average.
    val rnd = new java.util.Random(5)
    val globalAvg = (0 until 500).map { _ =>
      Series.euclidean(data(rnd.nextInt(800)), data(rnd.nextInt(800)))
    }.sum / 500
    var intra = 0.0; var cnt = 0
    for (q <- data.take(20)) {
      val r = t.approxSearch(q)
      intra += r.dist; cnt += 1
    }
    assert(intra / cnt < globalAvg)
  }
  test("materialized R-tree build is slower than R-tree+ build") {
    val dM = new DiskModel(); val dN = new DiskModel()
    RTreeSTR.build(data, p, 40, 64L * 1024, dM, materialized = true)
    RTreeSTR.build(data, p, 40, 64L * 1024, dN, materialized = false)
    assert(dM.elapsedMs > dN.elapsedMs)
  }
  test("every series appears exactly once in the leaf order") {
    val t = build(mat = false)
    // verified indirectly: searching for each of 50 indexed series finds distance 0
    data.take(50).foreach(s => assert(t.exactSearch(s).dist < 1e-9))
  }
}
