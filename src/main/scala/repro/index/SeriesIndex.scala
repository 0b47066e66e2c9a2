package repro.index

import repro.series.SaxParams
import repro.storage.DiskModel

/** Result of a similarity-search call.
  *
  * @param id             id (raw-file position) of the answer series
  * @param dist           Euclidean distance from the query to the answer
  * @param visitedRecords raw data-series records fetched to produce the
  *                       answer (the paper's Fig. 9f metric)
  */
final case class SearchResult(id: Long, dist: Double, visitedRecords: Long)

/** Common surface of every cost-modelled index in this repo (the paper's
  * contribution and all baselines). Construction happens in the companion
  * objects (`bulkLoad` / `build`); queries charge their I/O to [[disk]].
  */
trait SeriesIndex {
  /** Display name used in benchmark tables (e.g. "CTreeFull", "ADS+"). */
  def name: String
  /** Summarization parameters the index was built with. */
  def params: SaxParams
  /** Number of indexed series. */
  def size: Int
  /** True if raw series are materialized inside the index leaves. */
  def materialized: Boolean
  /** The disk model this index charges construction and query I/O to. */
  def disk: DiskModel
  /** Number of leaf nodes. */
  def leafCount: Int
  /** Mean leaf fill factor in [0,1] (occupancy / capacity). */
  def avgLeafFill: Double
  /** Index storage footprint in 4 KiB allocation pages (excludes the raw
    * file for non-materialized indexes, matching the paper's Fig. 8c
    * accounting). Contiguous bulk-loaded indexes pack their leaves into
    * one extent; prefix-split indexes allocate per leaf, so sparse leaves
    * waste space — the effect Fig. 8c measures.
    */
  def storagePages: Long

  /** Approximate search (paper Alg. 4): visit the most promising leaf
    * (± `radius` adjacent leaves where the layout has an order) and return
    * the best answer found there.
    */
  def approxSearch(q: Array[Double], radius: Int = 0): SearchResult

  /** Exact nearest-neighbor search (SIMS-style or branch-and-bound,
    * depending on the index).
    */
  def exactSearch(q: Array[Double]): SearchResult
}

object SeriesIndex {
  /** Filesystem allocation granularity used by [[SeriesIndex.storagePages]]. */
  val AllocPageBytes: Long = 4096L
  def pages(bytes: Long): Long = (bytes + AllocPageBytes - 1) / AllocPageBytes
}

object BruteForce {
  /** Ground-truth nearest neighbor by full scan (used by tests/benches). */
  def nn(data: Array[Array[Double]], q: Array[Double]): SearchResult = {
    var bestId = -1L; var best = Double.PositiveInfinity
    var i = 0
    while (i < data.length) {
      val d = repro.series.Series.euclidean(data(i), q)
      if (d < best) { best = d; bestId = i }
      i += 1
    }
    SearchResult(bestId, best, data.length)
  }
}
