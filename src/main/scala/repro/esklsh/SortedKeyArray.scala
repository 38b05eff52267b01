package repro.esklsh

/** One sorted hashkey array of ESK-LSH (the yellow boxes of paper Fig. 1).
  *
  * Keys are stored **bit-packed** — `m` bits each in a `Long` blob — so the
  * per-entry footprint scales with the hashkey length, like the paper's
  * string hashkeys do. This is what makes LIDER's per-cluster hashkey
  * shrink (M = ceil(log2 cluster-size) ≪ corpus-level M) show up as real
  * memory savings in Table 5. `ids(i)` is the local index of the vector
  * whose hashkey sits at position `i`; order is (key asc, id asc).
  */
final class SortedKeyArray private (
    private val packed: Array[Long],
    val ids: Array[Int],
    val m: Int)
    extends Serializable {

  def length: Int = ids.length

  /** The key at sorted position `i`, unpacked to a Long. */
  def key(i: Int): Long = {
    val bitPos = i.toLong * m
    val word = (bitPos >>> 6).toInt
    val off = (bitPos & 63).toInt
    if (off + m <= 64) (packed(word) >>> (64 - off - m)) & SortedKeyArray.mask(m)
    else {
      val hiBits = 64 - off
      val loBits = m - hiBits
      val hi = packed(word) & SortedKeyArray.mask(hiBits)
      val lo = packed(word + 1) >>> (64 - loBits)
      (hi << loBits) | lo
    }
  }

  /** Materializes all keys (build-time convenience for RMI training and
    * tests — not retained by the index).
    */
  def keys: Array[Long] = Array.tabulate(length)(key)

  /** Bytes held by this array's structures (packed keys + ids). */
  def sizeBytes: Long = packed.length.toLong * 8 + ids.length.toLong * 4

  /** Insertion point of `key`: the first position whose key is ≥ `key`. */
  def insertionPoint(k: Long): Int = {
    var lo = 0; var hi = length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (key(mid) < k) lo = mid + 1 else hi = mid
    }
    lo
  }
}

object SortedKeyArray {

  private def mask(bits: Int): Long = if (bits >= 64) -1L else (1L << bits) - 1

  /** Packs pre-sorted keys (the codec load path). */
  def fromSorted(keys: Array[Long], ids: Array[Int], m: Int): SortedKeyArray = {
    require(keys.length == ids.length, "keys/ids length mismatch")
    new SortedKeyArray(pack(keys, m), ids, m)
  }

  private def pack(keys: Array[Long], m: Int): Array[Long] = {
    val totalBits = keys.length.toLong * m
    val packed = new Array[Long](((totalBits + 63) >>> 6).toInt)
    var i = 0
    while (i < keys.length) {
      val bitPos = i.toLong * m
      val word = (bitPos >>> 6).toInt
      val off = (bitPos & 63).toInt
      val k = keys(i)
      if (off + m <= 64) packed(word) |= k << (64 - off - m)
      else {
        val hiBits = 64 - off
        val loBits = m - hiBits
        packed(word) |= k >>> loBits
        packed(word + 1) |= k << (64 - loBits)
      }
      i += 1
    }
    packed
  }

  /** Sorts (hashkey, id) pairs into a packed array.
    *
    * Fast path: when key bits + id bits fit in 63 bits, sort
    * `(key << idBits) | id` primitively — same order (key asc, id asc on
    * ties) with zero boxing. Falls back to a boxed sort for longer keys.
    */
  def build(hashkeys: Array[Long], m: Int): SortedKeyArray = {
    val n = hashkeys.length
    val idBits = if (n <= 1) 1 else 64 - java.lang.Long.numberOfLeadingZeros((n - 1).toLong).toInt
    val keys = new Array[Long](n)
    val ids = new Array[Int](n)
    if (m + idBits <= 63) {
      val sortable = new Array[Long](n)
      var i = 0
      while (i < n) { sortable(i) = (hashkeys(i) << idBits) | i.toLong; i += 1 }
      java.util.Arrays.sort(sortable)
      val idMask = (1L << idBits) - 1
      i = 0
      while (i < n) {
        keys(i) = sortable(i) >>> idBits
        ids(i) = (sortable(i) & idMask).toInt
        i += 1
      }
    } else {
      val boxed = Array.tabulate(n)(Integer.valueOf)
      java.util.Arrays.sort(
        boxed,
        (a: Integer, b: Integer) => {
          val c = java.lang.Long.compare(hashkeys(a), hashkeys(b))
          if (c != 0) c else Integer.compare(a, b)
        }
      )
      var i = 0
      while (i < n) { val src = boxed(i).intValue; keys(i) = hashkeys(src); ids(i) = src; i += 1 }
    }
    new SortedKeyArray(pack(keys, m), ids, m)
  }
}
