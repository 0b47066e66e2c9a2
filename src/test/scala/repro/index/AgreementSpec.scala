package repro.index

import org.scalatest.funsuite.AnyFunSuite

import repro.baselines.{DSTree, ISaxIndex, RTreeSTR, VerticalIndex}
import repro.core.{CoconutTree, CoconutTrie}
import repro.series.{SaxParams, SeriesGen}
import repro.storage.DiskModel

/** Cross-index agreement: every index's exact search must return the
  * brute-force nearest-neighbor distance on identical workloads — across
  * dataset kinds and summarization configurations. This is the repo-wide
  * guard that all lower bounds really are lower bounds and all search
  * algorithms really are exact.
  */
class AgreementSpec extends AnyFunSuite {

  private def allIndexes(data: Array[Array[Double]], p: SaxParams, cap: Int): Seq[SeriesIndex] = Seq(
    CoconutTree.bulkLoad(data, p, cap, 1L << 30, new DiskModel(), materialized = true),
    CoconutTree.bulkLoad(data, p, cap, 1L << 30, new DiskModel(), materialized = false),
    CoconutTrie.bulkLoad(data, p, cap, 1L << 30, new DiskModel(), materialized = true),
    CoconutTrie.bulkLoad(data, p, cap, 1L << 30, new DiskModel(), materialized = false),
    ISaxIndex.build(data, p, cap, 1L << 30, new DiskModel(), materialized = true),
    ISaxIndex.build(data, p, cap, 1L << 30, new DiskModel(), materialized = false),
    RTreeSTR.build(data, p, cap, 1L << 30, new DiskModel(), materialized = true),
    RTreeSTR.build(data, p, cap, 1L << 30, new DiskModel(), materialized = false),
    DSTree.build(data, p, cap, new DiskModel()),
    VerticalIndex.build(data, p, new DiskModel()),
  )

  for (kind <- Seq("walk", "seismic", "astronomy")) {
    test(s"all ten indexes agree with brute force on the $kind dataset") {
      val p = SaxParams(n = 64, w = 8, bits = 6)
      val data = SeriesGen.dataset(kind, 400, 64, seed = 21)
      val queries = SeriesGen.queries(kind, 10, 64, seed = 21)
      val idxs = allIndexes(data, p, cap = 30)
      for (q <- queries) {
        val want = BruteForce.nn(data, q).dist
        for (idx <- idxs) {
          val got = idx.exactSearch(q).dist
          assert(math.abs(got - want) < 1e-9, s"${idx.name} on $kind: got $got want $want")
        }
      }
    }
  }

  test("agreement holds for a coarse summarization (w=4, bits=3)") {
    val p = SaxParams(n = 32, w = 4, bits = 3)
    val data = SeriesGen.dataset("walk", 300, 32, seed = 31)
    val queries = SeriesGen.queries("walk", 8, 32, seed = 31)
    for (q <- queries) {
      val want = BruteForce.nn(data, q).dist
      for (idx <- allIndexes(data, p, cap = 25))
        assert(math.abs(idx.exactSearch(q).dist - want) < 1e-9, idx.name)
    }
  }

  test("agreement holds for the full 64-bit invSAX configuration (w=8, bits=8)") {
    val p = SaxParams(n = 64, w = 8, bits = 8)
    val data = SeriesGen.dataset("walk", 300, 64, seed = 41)
    val queries = SeriesGen.queries("walk", 8, 64, seed = 41)
    for (q <- queries) {
      val want = BruteForce.nn(data, q).dist
      for (idx <- allIndexes(data, p, cap = 25))
        assert(math.abs(idx.exactSearch(q).dist - want) < 1e-9, idx.name)
    }
  }

  test("approximate answers are never better than exact answers") {
    val p = SaxParams(n = 64, w = 8, bits = 6)
    val data = SeriesGen.dataset("walk", 400, 64, seed = 51)
    val queries = SeriesGen.queries("walk", 10, 64, seed = 51)
    for (q <- queries; idx <- allIndexes(data, p, cap = 30)) {
      assert(idx.approxSearch(q).dist >= idx.exactSearch(q).dist - 1e-9, idx.name)
    }
  }

  test("visited-records counts are positive and bounded by dataset size for exact search") {
    val p = SaxParams(n = 64, w = 8, bits = 6)
    val data = SeriesGen.dataset("walk", 400, 64, seed = 61)
    val q = SeriesGen.queries("walk", 1, 64, seed = 61)(0)
    for (idx <- allIndexes(data, p, cap = 30)) {
      val r = idx.exactSearch(q)
      assert(r.visitedRecords > 0 && r.visitedRecords <= 2L * 400, idx.name)
    }
  }
}
