package repro.core

import org.roaringbitmap.RoaringBitmap

/** In-memory RID index (§5) in compressed-sparse-row form — the analogue of a
  * GDBMS adjacency-list index.
  *
  * Keys are the RIDs of the pointed-to table P (0 until `nKeys`); for each key
  * the index stores the RIDs of the F rows whose materialized `rid_<fk>`
  * column equals the key. The *extended* form (§5.2) additionally stores, for
  * each F row, the RID of the other entity table the relationship F points to
  * (the neighbour node, in graph terms), enabling join merging.
  *
  * @param otherRids F-entry-aligned RIDs of the second predefined join's
  *                  target, or `null` when the index is not extended.
  */
final class RidIndexCsr(
    val nKeys: Int,
    val offsets: Array[Int],
    val fRids: Array[Int],
    val otherRids: Array[Int],
) {
  require(offsets.length == nKeys + 1, "offsets must have nKeys+1 entries")
  def nEntries: Int = fRids.length
  def extended: Boolean = otherRids != null

  def degree(key: Int): Int = offsets(key + 1) - offsets(key)

  /** F-RIDs joining with key; used by index nested loop joins (graphsim). */
  def neighbors(key: Int): Array[Int] =
    java.util.Arrays.copyOfRange(fRids, offsets(key), offsets(key + 1))

  /** Reverse-semijoin bitmask (§5.1): union of F-RID lists over the P-RIDs in
    * `keys` — what SJoinIdxR passes to ScanSJ(F).
    */
  def mapToF(keys: RoaringBitmap): RoaringBitmap = {
    val out = new RoaringBitmap()
    val it  = keys.getIntIterator
    while (it.hasNext) {
      val k = it.next()
      if (k >= 0 && k < nKeys) {
        var i = offsets(k)
        val end = offsets(k + 1)
        while (i < end) { out.add(fRids(i)); i += 1 }
      }
    }
    out
  }

  /** Join-merging (§5.2): (keyRid, otherRid) pairs for every key in `keys`,
    * produced without touching F's columns — the implicit join with F.
    */
  def pairsFor(keys: RoaringBitmap): (Array[Int], Array[Int]) = {
    var total = 0
    var it = keys.getIntIterator
    while (it.hasNext) {
      val k = it.next()
      if (k >= 0 && k < nKeys) total += degree(k)
    }
    val ks = new Array[Int](total)
    val os = new Array[Int](total)
    var w = 0
    it = keys.getIntIterator
    while (it.hasNext) {
      val k = it.next()
      if (k >= 0 && k < nKeys) {
        var i = offsets(k)
        val end = offsets(k + 1)
        while (i < end) {
          // dangling other-FK (-1): the F row matches no P2 row, skip
          if (otherRids(i) >= 0) { ks(w) = k; os(w) = otherRids(i); w += 1 }
          i += 1
        }
      }
    }
    (java.util.Arrays.copyOf(ks, w), java.util.Arrays.copyOf(os, w))
  }

  /** Other-side RIDs reachable from `keys` (join-merged semijoin bitmask). */
  def mapToOther(keys: RoaringBitmap): RoaringBitmap = {
    val out = new RoaringBitmap()
    val it  = keys.getIntIterator
    while (it.hasNext) {
      val k = it.next()
      if (k >= 0 && k < nKeys) {
        var i = offsets(k)
        val end = offsets(k + 1)
        while (i < end) { if (otherRids(i) >= 0) out.add(otherRids(i)); i += 1 }
      }
    }
    out
  }

  /** Approximate heap bytes (for the §7.2.2 memory-consumption comparison). */
  def sizeBytes: Long =
    4L * (offsets.length + fRids.length + (if (extended) otherRids.length else 0))
}

object RidIndexCsr {
  /** Build from parallel arrays of (key RID, F RID[, other RID]) tuples. */
  def build(nKeys: Int, keys: Array[Int], fs: Array[Int], others: Array[Int]): RidIndexCsr = {
    val n = keys.length
    val counts = new Array[Int](nKeys + 1)
    var i = 0
    while (i < n) { if (keys(i) >= 0) counts(keys(i) + 1) += 1; i += 1 }
    i = 0
    while (i < nKeys) { counts(i + 1) += counts(i); i += 1 }
    val offsets = counts.clone()
    val fOut = new Array[Int](offsets(nKeys))
    val oOut = if (others != null) new Array[Int](offsets(nKeys)) else null
    val cursor = offsets.clone()
    i = 0
    while (i < n) {
      val k = keys(i)
      if (k >= 0) {
        val w = cursor(k)
        fOut(w) = fs(i)
        if (oOut != null) oOut(w) = others(i)
        cursor(k) = w + 1
      }
      i += 1
    }
    new RidIndexCsr(nKeys, offsets, fOut, oOut)
  }
}
