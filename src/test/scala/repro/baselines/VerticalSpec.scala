package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import repro.index.BruteForce
import repro.series.{SaxParams, Series, SeriesGen}
import repro.storage.DiskModel

class VerticalSpec extends AnyFunSuite {

  private val p = SaxParams(n = 64, w = 8, bits = 6)
  private val data = SeriesGen.dataset("walk", 600, 64, seed = 8)
  private val queries = SeriesGen.queries("walk", 15, 64, seed = 8)

  private def build(disk: DiskModel = new DiskModel()) = VerticalIndex.build(data, p, disk)

  test("haar transform is orthonormal: distances are preserved") {
    val rnd = new java.util.Random(11)
    (0 until 100).foreach { _ =>
      val a = Array.fill(64)(rnd.nextGaussian()); val b = Array.fill(64)(rnd.nextGaussian())
      val da = Series.euclidean(a, b)
      val dh = Series.euclidean(VerticalIndex.haar(a), VerticalIndex.haar(b))
      assert(math.abs(da - dh) < 1e-9)
    }
  }
  test("haar preserves the vector norm") {
    val rnd = new java.util.Random(12)
    (0 until 100).foreach { _ =>
      val a = Array.fill(32)(rnd.nextGaussian())
      val na = math.sqrt(a.map(v => v * v).sum)
      val nh = math.sqrt(VerticalIndex.haar(a).map(v => v * v).sum)
      assert(math.abs(na - nh) < 1e-9)
    }
  }
  test("haar of a constant series concentrates energy in the average") {
    val h = VerticalIndex.haar(Array.fill(16)(3.0))
    assert(math.abs(h(0) - 3.0 * 4) < 1e-9) // 3 * sqrt(16)
    h.drop(1).foreach(c => assert(math.abs(c) < 1e-9))
  }
  test("haar rejects non-power-of-two lengths") {
    intercept[IllegalArgumentException](VerticalIndex.haar(new Array[Double](12)))
  }
  test("levelStarts covers all coefficients exactly") {
    assert(VerticalIndex.levelStarts(8).sameElements(Array(0, 1, 2, 4, 8)))
    assert(VerticalIndex.levelStarts(64).last == 64)
  }
  test("partial Haar prefix distance lower-bounds the full distance") {
    val rnd = new java.util.Random(13)
    (0 until 100).foreach { _ =>
      val a = Array.fill(64)(rnd.nextGaussian()); val b = Array.fill(64)(rnd.nextGaussian())
      val ha = VerticalIndex.haar(a); val hb = VerticalIndex.haar(b)
      val partial = math.sqrt((0 until 8).map(i => (ha(i) - hb(i)) * (ha(i) - hb(i))).sum)
      assert(partial <= Series.euclidean(a, b) + 1e-9)
    }
  }
  test("exact search matches brute force") {
    val t = build()
    for (q <- queries)
      assert(math.abs(t.exactSearch(q).dist - BruteForce.nn(data, q).dist) < 1e-9)
  }
  test("approximate search returns valid distances") {
    val t = build()
    for (q <- queries.take(5)) {
      val r = t.approxSearch(q)
      assert(math.abs(r.dist - Series.euclidean(data(r.id.toInt), q)) < 1e-9)
    }
  }
  test("searching for an indexed series finds it exactly") {
    val t = build()
    data.take(20).foreach(s => assert(t.exactSearch(s).dist < 1e-9))
  }
  test("construction performs one pass per resolution level") {
    val disk = new DiskModel()
    build(disk = disk)
    val ctDisk = new DiskModel()
    repro.core.CoconutTree.bulkLoad(data, p, 40, 256L * 1024, ctDisk, materialized = true)
    assert(disk.blocksRead > ctDisk.blocksRead,
      "stepwise level-at-a-time construction re-reads the raw data per level")
  }
  test("stepwise scan prunes candidates level by level") {
    val t = build()
    val avg = queries.map(t.exactSearch(_).visitedRecords.toDouble).sum / queries.length
    assert(avg < 600, s"visited $avg of 600")
  }
}
