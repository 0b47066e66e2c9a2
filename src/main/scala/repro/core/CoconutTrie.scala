package repro.core

import scala.collection.mutable.ArrayBuffer

import repro.series.{InvSAX, SaxParams}
import repro.storage.{DiskModel, ExternalSort}

/** Coconut-Trie (paper §4.2, Algorithm 2): bottom-up bulk loading of a
  * *prefix-split* iSAX trie from the invSAX-sorted run, followed by
  * `CompactSubtree`.
  *
  * Because the entries are z-order sorted, the fully-compacted trie is
  * exactly the partition obtained by recursively splitting the sorted run
  * on the next interleaved bit until every piece fits a leaf: every leaf
  * covers one maximal SAX-prefix range with ≤ capacity entries. We build
  * that partition directly (CPU side) and charge the I/O of the paper's
  * actual procedure: one initial node per distinct SAX word written out,
  * then pairwise sibling merges (one random read + one random write each)
  * until no more leaves merge. This is what makes Coconut-Trie
  * construction markedly slower than Coconut-Tree (Fig. 8a/8b) even though
  * both start from the same sorted run.
  *
  * The resulting index shares the sorted-contiguous-leaf query engine of
  * [[CoconutTree]] (approximate search + SIMS exact search); only leaf
  * boundary placement and construction cost differ. Prefix splitting
  * cannot balance occupancy, so leaves are sparsely filled — the paper's
  * §4.3 motivation for Coconut-Tree.
  */
object CoconutTrie {

  /** Bulk load a Coconut-Trie ("CTrie", or "CTrieFull" when materialized). */
  def bulkLoad(data: Array[Array[Double]], p: SaxParams, leafCapacity: Int,
               memBytes: Long, disk: DiskModel, materialized: Boolean,
               defaultRadius: Int = 1): CoconutTree = {
    require(data.nonEmpty)
    val n = data.length
    val len = data(0).length
    val sumBytes = p.wordBytes + 8
    val rawBytes = len * 8
    val rawFile = disk.file("raw", rawBytes)
    val leafRec = if (materialized) rawBytes + sumBytes else sumBytes
    val indexFile = disk.file(if (materialized) "ctrie-full-index" else "ctrie-index", leafRec)

    // Summarize pass + external sort of the (invSAX, offset) run — same
    // lines 2-12 of Algorithm 2 as Coconut-Tree.
    rawFile.scan(n.toLong)
    val entries = Array.tabulate(n)(i => Entry(InvSAX.ofSeries(data(i), p), i))
    val sortFile = disk.file(if (materialized) "ctrie-full-sort" else "ctrie-sort", leafRec)
    ExternalSort.charge(sortFile, n.toLong, memBytes)
    java.util.Arrays.sort(entries, Ordering.by[Entry, Long](_.inv))

    // Prefix-split the sorted run on interleaved bits (≡ compacted trie).
    val cuts = ArrayBuffer(0)
    def firstWithBitSet(lo: Int, hi: Int, bit: Int): Int = {
      // entries sorted by inv ⇒ bit value is monotone within a shared prefix
      var a = lo; var b = hi
      while (a < b) {
        val mid = (a + b) >>> 1
        val raw = entries(mid).inv ^ Long.MinValue
        if (((raw >>> (63 - bit)) & 1L) == 0L) a = mid + 1 else b = mid
      }
      a
    }
    def split(lo: Int, hi: Int, bit: Int): Unit = {
      if (hi - lo <= leafCapacity || bit >= p.totalBits) cuts += hi
      else {
        val mid = firstWithBitSet(lo, hi, bit)
        if (mid == lo || mid == hi) split(lo, hi, bit + 1)
        else { split(lo, mid, bit + 1); split(mid, hi, bit + 1) }
      }
    }
    split(0, n, 0)

    // Charge the bottom-up build + CompactSubtree: the fine-grained
    // one-node-per-distinct-word leaves are written once, then the
    // iterative sibling-merge compaction re-reads and re-writes the
    // (contiguous) leaf level until no more leaves merge — one pass per
    // doubling of leaf occupancy, i.e. ~log2(capacity) sequential passes.
    // This is the extra construction work Fig. 8a/8b charge Coconut-Trie
    // for relative to Coconut-Tree.
    indexFile.appendRange(n.toLong)
    val compactionRounds = math.max(1, (math.log(leafCapacity) / math.log(2)).ceil.toInt)
    var round = 0
    while (round < compactionRounds) {
      indexFile.resetCursor(); indexFile.scan(n.toLong)
      indexFile.appendRange(n.toLong)
      round += 1
    }
    // CTrieFull additionally moves each raw series from the (unsorted) raw
    // file into its sorted leaf; with the raw data larger than memory this
    // is a cache miss per series (the paper's "extensive I/Os ... on the
    // last pass"), otherwise one sequential pass.
    if (materialized) {
      val rawTotal = n.toLong * rawBytes
      if (rawTotal <= memBytes) { rawFile.resetCursor(); rawFile.scan(n.toLong) }
      else {
        val missRate = 1.0 - memBytes.toDouble / rawTotal
        rawFile.chargeRandom(math.round(n * missRate), write = false)
      }
      indexFile.appendRange(n.toLong)
    }

    // Assemble the shared sorted-leaf engine with prefix-split boundaries.
    val leaves = ArrayBuffer.empty[Leaf]
    var pos = 0L
    var c = 0
    while (c < cuts.length - 1) {
      val l = new Leaf(leafCapacity)
      var j = cuts(c)
      while (j < cuts(c + 1)) { l.entries += entries(j); j += 1 }
      l.filePos = pos
      pos += l.occupancy
      leaves += l
      c += 1
    }
    val buf = ArrayBuffer.empty[Array[Double]]; buf ++= data
    new CoconutTree(if (materialized) "CTrieFull" else "CTrie",
                    p, buf, leaves, materialized, disk, rawFile, indexFile, defaultRadius,
                    perLeafAlloc = true)
  }
}
