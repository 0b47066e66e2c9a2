package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.index.BruteForce
import repro.series.{InvSAX, SaxParams, SeriesGen}
import repro.storage.DiskModel

class CoconutTreeSpec extends AnyFunSuite {

  private val p = SaxParams(n = 64, w = 8, bits = 6)
  private val data = SeriesGen.dataset("walk", 1000, 64, seed = 1)
  private val queries = SeriesGen.queries("walk", 30, 64, seed = 1)
  private def mem(bytes: Long) = bytes

  private def build(mat: Boolean, cap: Int = 50, memBytes: Long = 1L << 30,
                    disk: DiskModel = new DiskModel()) =
    CoconutTree.bulkLoad(data, p, cap, memBytes, disk, materialized = mat)

  test("bulk load packs leaves to the target fill factor") {
    val t = build(mat = false)
    assert(t.leafCount == 20)
    assert(t.leaves.init.forall(_.occupancy == 50))
    assert(t.avgLeafFill > 0.95)
  }
  test("bulk load with partial fill factor leaves headroom") {
    val disk = new DiskModel()
    val t = CoconutTree.bulkLoad(data, p, 50, mem(1L << 30), disk, materialized = false, fill = 0.5)
    assert(t.leaves.init.forall(_.occupancy == 25))
  }
  test("leaves are globally sorted by invSAX") {
    val t = build(mat = false)
    val all = t.leaves.flatMap(_.entries.map(_.inv))
    assert(all == all.sorted)
  }
  test("every series appears exactly once in the index") {
    val t = build(mat = true)
    val ids = t.leaves.flatMap(_.entries.map(_.id)).sorted
    assert(ids == (0 until 1000))
  }
  test("leaf file positions are contiguous after bulk load") {
    val t = build(mat = false)
    var pos = 0L
    t.leaves.foreach { l => assert(l.filePos == pos); pos += l.occupancy }
  }
  test("index name reflects materialization") {
    assert(build(mat = true).name == "CTreeFull")
    assert(build(mat = false).name == "CTree")
  }
  test("approximate search returns a real series with its true distance") {
    val t = build(mat = true)
    for (q <- queries.take(10)) {
      val r = t.approxSearch(q, radius = 1)
      assert(r.id >= 0 && r.id < 1000)
      assert(math.abs(r.dist - repro.series.Series.euclidean(data(r.id.toInt), q)) < 1e-9)
    }
  }
  test("approximate search quality improves (or holds) with radius") {
    val t = build(mat = true)
    var improved = 0
    for (q <- queries) {
      val d0 = t.approxSearch(q, radius = 0).dist
      val d5 = t.approxSearch(q, radius = 5).dist
      assert(d5 <= d0 + 1e-9)
      if (d5 < d0 - 1e-9) improved += 1
    }
    assert(improved > 0, "radius should strictly help at least once over 30 queries")
  }
  test("exact search matches brute force (materialized)") {
    val t = build(mat = true)
    for (q <- queries) {
      val r = t.exactSearch(q)
      val bf = BruteForce.nn(data, q)
      assert(math.abs(r.dist - bf.dist) < 1e-9, s"got ${r.dist}, want ${bf.dist}")
    }
  }
  test("exact search matches brute force (non-materialized)") {
    val t = build(mat = false)
    for (q <- queries) {
      assert(math.abs(t.exactSearch(q).dist - BruteForce.nn(data, q).dist) < 1e-9)
    }
  }
  test("exact search visits far fewer records than a full scan") {
    val t = build(mat = true)
    val avgVisited = queries.map(t.exactSearch(_).visitedRecords.toDouble).sum / queries.length
    assert(avgVisited < 1000 * 0.6, s"visited $avgVisited of 1000")
  }
  test("construction I/O is dominated by sequential access") {
    val disk = new DiskModel()
    build(mat = true, disk = disk)
    assert(disk.seqBlocks > disk.randomOps * 3,
      s"bulk loading should be sequential: seq=${disk.seqBlocks} rand=${disk.randomOps}")
  }
  test("limited memory triggers external sort passes (more I/O)") {
    val dAmple = new DiskModel(); val dTight = new DiskModel()
    CoconutTree.bulkLoad(data, p, 50, 1L << 30, dAmple, materialized = true)
    CoconutTree.bulkLoad(data, p, 50, 64L * 1024, dTight, materialized = true)
    assert(dTight.blocksWritten > dAmple.blocksWritten)
  }
  test("non-materialized construction moves far fewer bytes than materialized") {
    val dM = new DiskModel(); val dN = new DiskModel()
    CoconutTree.bulkLoad(data, p, 50, 32L * 1024, dM, materialized = true)
    CoconutTree.bulkLoad(data, p, 50, 32L * 1024, dN, materialized = false)
    assert(dN.blocksWritten < dM.blocksWritten)
  }
  test("storage footprint of materialized index covers the data") {
    val t = build(mat = true)
    // 1000 series of 64 doubles = 512KB => at least 8 blocks of 64KB
    assert(t.storagePages >= 8)
  }
  test("bulk insert preserves sorted order and query correctness") {
    val t = build(mat = false, cap = 50)
    val extra = SeriesGen.dataset("walk", 200, 64, seed = 77)
    t.bulkInsert(extra)
    assert(t.size == 1200)
    val all = t.leaves.flatMap(_.entries.map(_.inv))
    assert(all == all.sorted, "global z-order must survive bulk insert")
    val combined = data ++ extra
    for (q <- queries.take(10)) {
      assert(math.abs(t.exactSearch(q).dist - BruteForce.nn(combined, q).dist) < 1e-9)
    }
  }
  test("bulk insert splits overflowing leaves at the median") {
    val t = build(mat = false, cap = 50)
    val before = t.leafCount
    t.bulkInsert(SeriesGen.dataset("walk", 500, 64, seed = 88))
    assert(t.leafCount > before)
    // every split leaf must hold at least ~half capacity
    t.leaves.foreach(l => assert(l.occupancy >= 1 && l.occupancy <= 50))
  }
  test("few large batches cost less I/O than many small batches") {
    def runBatches(sizes: Seq[Int]): Double = {
      val disk = new DiskModel()
      val t = CoconutTree.bulkLoad(data, p, 50, 1L << 30, disk, materialized = false)
      val s0 = disk.snapshot
      var seed = 100
      for (sz <- sizes) { t.bulkInsert(SeriesGen.dataset("walk", sz, 64, seed)); seed += 1 }
      disk.elapsedMs - s0.elapsedMs
    }
    val manySmall = runBatches(Seq.fill(50)(20))
    val fewLarge = runBatches(Seq(500, 500))
    assert(fewLarge < manySmall,
      s"bulk loading larger batches must be cheaper: large=$fewLarge small=$manySmall")
  }
  test("entries round-trip their SAX words through the stored invSAX") {
    val t = build(mat = false)
    t.leaves.flatMap(_.entries).take(100).foreach { e =>
      val word = InvSAX.fromLong(e.inv, p)
      assert(InvSAX.toLong(word, p) == e.inv)
    }
  }
  test("bulkLoad rejects empty input") {
    intercept[IllegalArgumentException] {
      CoconutTree.bulkLoad(Array.empty, p, 10, 1L << 20, new DiskModel(), materialized = false)
    }
  }
}
