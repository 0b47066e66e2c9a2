package repro.baselines

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

import repro.core.Entry
import repro.index.{SearchResult, SeriesIndex}
import repro.series.{SAX, SaxParams, Series}
import repro.storage.{DiskModel, SimFile}

/** State-of-the-art baseline family: iSAX 2.0-style top-down prefix-split
  * tree with FBL buffering (paper §3.1, Fig. 3), in the two variants the
  * paper evaluates:
  *
  *  - '''ADSFull''' — materialized clustered index: two passes over the raw
  *    file, raw series stored in the leaves;
  *  - '''ADS+''' — non-materialized adaptive index: leaves hold
  *    `(SAX, offset)` pairs and are materialized lazily on first access
  *    during query answering.
  *
  * Construction is top-down: inserts are buffered in memory (budget
  * `memBytes`); when the buffer fills, every touched leaf is read and
  * rewritten — scattered random I/O, because split-produced leaves are not
  * contiguous on disk. A node that overflows splits on the segment whose
  * next unprefixed bit divides its residents most evenly (the paper's
  * policy); prefix splitting cannot guarantee balance, so leaves end up
  * sparsely populated.
  *
  * Exact search is the original SIMS algorithm [62]: in-memory SAX
  * summaries scanned in raw-file order, skip-sequential fetch of unpruned
  * raw records, seeded by an approximate-search best-so-far.
  *
  * The index is built over a fixed `data` array but may cover only a
  * prefix of it (`size` grows via [[insertSlice]]) — this supports the
  * paper's §5.3 updates experiment, where batches arrive interleaved with
  * queries.
  */
final class ISaxIndex private[baselines] (
    val name: String,
    val params: SaxParams,
    val data: Array[Array[Double]],
    val materialized: Boolean,
    val disk: DiskModel,
    val leafCapacity: Int,
    memBytes: Long,
) extends SeriesIndex {
  import ISaxIndex.Node

  private val sumBytes = params.wordBytes + 8
  private val rawBytes = data(0).length * 8
  private[baselines] val rawFile: SimFile = disk.file("raw", rawBytes)
  private[baselines] val indexFile: SimFile =
    disk.file(if (materialized) "ads-full-index" else "ads-index",
              if (materialized) rawBytes + sumBytes else sumBytes)
  private val matFile: SimFile = disk.file("ads-mat", rawBytes + sumBytes)

  /** SAX words for all series (computed lazily per slice on insert). */
  private val words: Array[Array[Int]] = new Array[Array[Int]](data.length)
  private val root = mutable.LongMap.empty[Node]
  private val pending = ArrayBuffer.empty[Int] // buffered series ids (the FBL)
  private val bufferCapacity: Int =
    math.max(1, (memBytes / (if (materialized) rawBytes + sumBytes else sumBytes)).toInt)

  /** Number of series inserted so far (≤ data.length). */
  var size: Int = 0

  def adaptive: Boolean = !materialized

  private def collectLeaves: Seq[Node] = {
    val out = ArrayBuffer.empty[Node]
    def rec(nd: Node): Unit = if (nd.isLeaf) out += nd else { rec(nd.left); rec(nd.right) }
    root.values.foreach(rec)
    out.toSeq
  }

  def leafCount: Int = collectLeaves.size
  def avgLeafFill: Double = {
    val ls = collectLeaves
    if (ls.isEmpty) 0.0 else ls.map(_.entries.length.toDouble / leafCapacity).sum / ls.size
  }
  /** Split-scattered leaves allocate individually. */
  def storagePages: Long =
    collectLeaves.map(l => SeriesIndex.pages(l.entries.length.toLong * indexFile.recordBytes)).sum

  // ------------------------------------------------------------------ build

  /** Insert `data(from until until)` top-down through the FBL buffer,
    * charging the summarize pass (+ the raw re-read for materialized
    * builds) and the buffered leaf read/write traffic.
    */
  def insertSlice(from: Int, until: Int): Unit = {
    require(from == size, s"inserts must be consecutive: expected $size, got $from")
    rawFile.readRange(from.toLong, (until - from).toLong) // summarize pass
    if (materialized) { rawFile.resetCursor(); rawFile.readRange(from.toLong, (until - from).toLong) }
    var i = from
    while (i < until) {
      words(i) = SAX.sax(data(i), params)
      pending += i
      if (pending.length >= bufferCapacity) flush()
      i += 1
    }
    flush()
    size = until
  }

  /** Flush the FBL: route every buffered series to its leaf, then read,
    * merge, split (if overflowing) and rewrite each touched leaf.
    *
    * I/O pattern: a leaf that already lives on disk must be re-read and
    * re-written in place — scattered random I/O (this is the top-down
    * construction penalty). Leaves written for the first time in a flush
    * are appended together sequentially, which is why a buffer that holds
    * the whole dataset (ample memory) builds almost as fast as bulk
    * loading (paper Fig. 8b: ADS+ 6.3 vs CTree 7.8 min with ample RAM).
    */
  private def flush(): Unit = {
    if (pending.isEmpty) return
    val byLeaf = mutable.LinkedHashMap.empty[Node, ArrayBuffer[Int]]
    for (id <- pending) byLeaf.getOrElseUpdate(routeToLeaf(words(id)), ArrayBuffer.empty) += id
    var appended = 0L
    for ((leaf, ids) <- byLeaf) {
      val wasOnDisk = leaf.onDisk
      if (wasOnDisk) indexFile.accessScattered(leaf.entries.length.toLong, write = false)
      leaf.entries ++= ids.map(id => Entry(0L, id))
      // Split while over capacity, collecting the resulting leaves.
      val result = ArrayBuffer.empty[Node]
      val work = mutable.Queue(leaf)
      while (work.nonEmpty) {
        val nd = work.dequeue()
        if (nd.entries.length > leafCapacity && split(nd)) {
          work.enqueue(nd.left); work.enqueue(nd.right)
        } else result += nd
      }
      result.foreach { l =>
        if (wasOnDisk) indexFile.accessScattered(l.entries.length.toLong, write = true)
        else appended += l.entries.length
        l.onDisk = true
      }
    }
    if (appended > 0) indexFile.appendRange(appended)
    pending.clear()
  }

  /** Descend (creating the root child if needed) to the target leaf. */
  private def routeToLeaf(word: Array[Int]): Node = {
    val key = ISaxIndex.rootKey(word, params)
    var n = root.getOrElseUpdate(key, {
      val syms = Array.tabulate(params.w)(j => (word(j) >>> (params.bits - 1)) & 1)
      new Node(syms, Array.fill(params.w)(1))
    })
    while (!n.isLeaf) {
      val bit = (word(n.splitSeg) >>> (params.bits - (n.lens(n.splitSeg) + 1))) & 1
      n = if (bit == 0) n.left else n.right
    }
    n
  }

  /** Split on the segment whose next unprefixed bit divides the entries
    * most evenly (paper §2/§3.2); false when every segment is fully
    * refined (identical words — the leaf is allowed to overflow).
    */
  private def split(nd: Node): Boolean = {
    var bestSeg = -1; var bestBalance = -1
    var j = 0
    while (j < params.w) {
      if (nd.lens(j) < params.bits) {
        var ones = 0
        nd.entries.foreach { e =>
          if (((words(e.id)(j) >>> (params.bits - (nd.lens(j) + 1))) & 1) == 1) ones += 1
        }
        val balance = math.min(ones, nd.entries.length - ones)
        if (balance > bestBalance) { bestBalance = balance; bestSeg = j }
      }
      j += 1
    }
    if (bestSeg < 0) return false
    val lSyms = nd.symbols.clone; val rSyms = nd.symbols.clone
    val lLens = nd.lens.clone;    val rLens = nd.lens.clone
    lLens(bestSeg) += 1; rLens(bestSeg) += 1
    lSyms(bestSeg) = nd.symbols(bestSeg) << 1
    rSyms(bestSeg) = (nd.symbols(bestSeg) << 1) | 1
    nd.left = new Node(lSyms, lLens); nd.right = new Node(rSyms, rLens)
    nd.splitSeg = bestSeg
    nd.entries.foreach { e =>
      val bit = (words(e.id)(bestSeg) >>> (params.bits - (nd.lens(bestSeg) + 1))) & 1
      (if (bit == 0) nd.left else nd.right).entries += e
    }
    nd.entries = ArrayBuffer.empty
    true
  }

  // ----------------------------------------------------------------- query

  /** The most promising leaf for a query word: structural descent when the
    * root subtree exists, otherwise the root child with minimal prefix
    * MINDIST.
    */
  private def promisingLeaf(word: Array[Int]): Node = {
    val start = root.getOrElse(ISaxIndex.rootKey(word, params),
                               root.values.minBy(n => ISaxIndex.prefixMinDist(word, n, params)))
    var n = start
    while (!n.isLeaf) {
      val bit = (word(n.splitSeg) >>> (params.bits - (n.lens(n.splitSeg) + 1))) & 1
      n = if (bit == 0) n.left else n.right
    }
    n
  }

  private def scanLeaf(leaf: Node, q: Array[Double], bsf0: Double, id0: Long): (Double, Long, Long) = {
    var bsf = bsf0; var bestId = id0; var visited = 0L
    if (materialized) {
      indexFile.accessScattered(leaf.entries.length.toLong, write = false)
    } else if (!leaf.materializedLeaf) {
      // ADS+ materializes the leaf on first touch during query answering:
      // read the minimal leaf, fetch every member's raw series, write the
      // refined leaf.
      indexFile.accessScattered(leaf.entries.length.toLong, write = false)
      leaf.entries.foreach(e => rawFile.readRecord(e.id.toLong))
      matFile.accessScattered(leaf.entries.length.toLong, write = true)
      leaf.materializedLeaf = true
    } else {
      matFile.accessScattered(leaf.entries.length.toLong, write = false)
    }
    leaf.entries.foreach { e =>
      val d2 = Series.squaredEuclideanAbandon(data(e.id), q, bsf * bsf)
      visited += 1
      if (d2 < bsf * bsf) { bsf = math.sqrt(d2); bestId = e.id }
    }
    (bsf, bestId, visited)
  }

  /** Approximate search: the single most promising leaf (`radius` has no
    * meaning for a non-contiguous prefix tree and is ignored).
    */
  def approxSearch(q: Array[Double], radius: Int = 0): SearchResult = {
    require(size > 0, "empty index")
    val word = SAX.sax(q, params)
    val (bsf, id, visited) = scanLeaf(promisingLeaf(word), q, Double.PositiveInfinity, -1L)
    SearchResult(id, bsf, visited)
  }

  /** Exact search via SIMS [62]. */
  def exactSearch(q: Array[Double]): SearchResult = {
    val approx = approxSearch(q)
    val qPaa = Series.paa(q, params.w)
    var bsf = approx.dist; var bestId = approx.id; var visited = approx.visitedRecords
    var i = 0
    while (i < size) {
      val md = SAX.minDistPaaToSax(qPaa, words(i), params)
      if (md < bsf) {
        rawFile.readRecord(i.toLong)
        visited += 1
        val d2 = Series.squaredEuclideanAbandon(data(i), q, bsf * bsf)
        if (d2 < bsf * bsf) { bsf = math.sqrt(d2); bestId = i }
      }
      i += 1
    }
    SearchResult(bestId, bsf, visited)
  }
}

object ISaxIndex {

  /** A prefix-split tree node: per-segment symbol prefixes of `lens(j)`
    * bits each. Leaves hold entries; internal nodes split one segment's
    * next bit into two children.
    */
  final class Node(val symbols: Array[Int], val lens: Array[Int]) {
    var entries: ArrayBuffer[Entry] = ArrayBuffer.empty
    var left: Node = _
    var right: Node = _
    var splitSeg: Int = -1
    var materializedLeaf: Boolean = false
    /** True once the leaf has been flushed to disk at least once; later
      * flushes must read + rewrite it in place (random I/O).
      */
    var onDisk: Boolean = false
    def isLeaf: Boolean = left == null
  }

  private[baselines] def rootKey(word: Array[Int], p: SaxParams): Long = {
    var k = 0L; var j = 0
    while (j < p.w) { k = (k << 1) | ((word(j) >>> (p.bits - 1)) & 1); j += 1 }
    k
  }

  /** MINDIST between a full-resolution word and a node's prefix regions
    * (0 where the word's symbol falls inside the prefix region).
    */
  private[baselines] def prefixMinDist(word: Array[Int], n: Node, p: SaxParams): Double = {
    var acc = 0.0; var j = 0
    while (j < p.w) {
      val len = n.lens(j)
      if (len > 0) {
        val lo = n.symbols(j) << (p.bits - len)
        val hi = ((n.symbols(j) + 1) << (p.bits - len)) - 1
        val s = word(j)
        if (s < lo) { val d = SAX.regionLow(lo, p) - SAX.regionHigh(s, p); if (d > 0) acc += d * d }
        else if (s > hi) { val d = SAX.regionLow(s, p) - SAX.regionHigh(hi, p); if (d > 0) acc += d * d }
      }
      j += 1
    }
    math.sqrt(acc * p.n / p.w)
  }

  /** Build an ADSFull (`materialized = true`) or ADS+ (`materialized =
    * false`) index over all of `data` with an FBL buffer of `memBytes`.
    */
  def build(data: Array[Array[Double]], p: SaxParams, leafCapacity: Int,
            memBytes: Long, disk: DiskModel, materialized: Boolean): ISaxIndex = {
    val idx = empty(data, p, leafCapacity, memBytes, disk, materialized)
    idx.insertSlice(0, data.length)
    idx
  }

  /** An empty index over a pre-allocated `data` array; populate with
    * [[ISaxIndex.insertSlice]] (used by the updates experiment).
    */
  def empty(data: Array[Array[Double]], p: SaxParams, leafCapacity: Int,
            memBytes: Long, disk: DiskModel, materialized: Boolean): ISaxIndex = {
    require(data.nonEmpty)
    new ISaxIndex(if (materialized) "ADSFull" else "ADS+",
                  p, data, materialized, disk, leafCapacity, memBytes)
  }
}
