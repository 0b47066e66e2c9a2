package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import repro.index.BruteForce
import repro.series.{SaxParams, Series, SeriesGen}
import repro.storage.DiskModel

class DSTreeSpec extends AnyFunSuite {

  private val p = SaxParams(n = 64, w = 8, bits = 6)
  private val data = SeriesGen.dataset("walk", 600, 64, seed = 6)
  private val queries = SeriesGen.queries("walk", 15, 64, seed = 6)

  private def build(cap: Int = 40, disk: DiskModel = new DiskModel()) =
    DSTree.build(data, p, cap, disk)

  test("segmentStats computes per-segment mean and std") {
    val s = Array[Double](1, 1, 1, 1, 2, 4, 2, 4)
    val (m, sd) = DSTree.segmentStats(s, 2)
    assert(m.sameElements(Array(1.0, 3.0)))
    assert(math.abs(sd(0)) < 1e-12 && math.abs(sd(1) - 1.0) < 1e-12)
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
    data.take(30).foreach(s => assert(t.exactSearch(s).dist < 1e-9))
  }
  test("median mean-splits keep leaves reasonably full") {
    val t = build(cap = 40)
    assert(t.avgLeafFill > 0.4, s"fill was ${t.avgLeafFill}")
  }
  test("construction is dominated by random I/O (unbuffered top-down)") {
    val disk = new DiskModel()
    build(disk = disk)
    assert(disk.randomOps > 600, "each insert should pay at least a leaf read")
  }
  test("DSTree construction is the slowest of all indexes (paper Fig. 8a)") {
    val dDs = new DiskModel(); val dCt = new DiskModel(); val dAds = new DiskModel()
    DSTree.build(data, p, 40, dDs)
    repro.core.CoconutTree.bulkLoad(data, p, 40, 256L * 1024, dCt, materialized = true)
    ISaxIndex.build(data, p, 40, 256L * 1024, dAds, materialized = true)
    assert(dDs.elapsedMs > dCt.elapsedMs)
    assert(dDs.elapsedMs > dAds.elapsedMs)
  }
  test("DSTree storage is compact (paper Fig. 8c)") {
    val t = build(cap = 40)
    val ads = ISaxIndex.build(data, p, 40, 1L << 30, new DiskModel(), materialized = true)
    assert(t.storagePages <= ads.storagePages)
  }
  test("exact search prunes with the EAPCA bound") {
    val t = build()
    val avg = queries.map(t.exactSearch(_).visitedRecords.toDouble).sum / queries.length
    assert(avg < 600)
  }
}
