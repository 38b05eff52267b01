package repro.esklsh

import repro.linalg.Parallel
import repro.lsh.{Hashkey, RandomHyperplaneLSH}

/** Extended SK-LSH (paper §4): hyperplane LSH for cosine similarity,
  * `H` sorted hashkey arrays, the extended hashkey distance `dist_e`
  * (Eq. 7), and *parallel, per-array-local* bi-directional expansion
  * (§4.3) instead of the original iterative globally-closest expansion.
  *
  * @param lsh    the base LSH model (H compound functions of length M)
  * @param arrays one sorted array per compound function
  * @param b      window width B of KD_e (Eq. 6); C = 2^B
  */
final class ESKLSH(val lsh: RandomHyperplaneLSH, val arrays: Array[SortedKeyArray], val b: Int)
    extends Serializable {

  def numArrays: Int = arrays.length
  def keyLen: Int = lsh.keyLen
  def size: Int = if (arrays.isEmpty) 0 else arrays(0).length

  /** Query hashkeys, one per array. */
  def hashQuery(q: Array[Float]): Array[Long] = lsh.hashAll(q)

  /** Bi-directional expansion on a single array (paper §3.3.1): starting
    * from `start` (an RMI prediction, or an insertion point for the
    * baseline), repeatedly takes whichever side's frontier hashkey is
    * closer to the query hashkey by `dist_e`, until `range` candidates are
    * collected or the array is exhausted. Returns positions' vector ids.
    */
  def expandOne(arrayIdx: Int, queryKey: Long, start: Int, range: Int): Array[Int] = {
    val arr = arrays(arrayIdx)
    val n = arr.length
    if (n == 0) return Array.emptyIntArray
    val take = math.min(range, n)
    val out = new Array[Int](take)
    // Left frontier l points at the last position ≤ start-ish side; right
    // frontier r at the next position. `start` itself is consumed first via r.
    var r = math.min(n - 1, math.max(0, start))
    var l = r - 1
    var filled = 0
    while (filled < take) {
      val leftOk = l >= 0
      val rightOk = r < n
      val takeLeft =
        if (!rightOk) true
        else if (!leftOk) false
        else {
          val dl = Hashkey.distExtended(arr.key(l), queryKey, arr.m, b)
          val dr = Hashkey.distExtended(arr.key(r), queryKey, arr.m, b)
          dl < dr
        }
      if (takeLeft) { out(filled) = arr.ids(l); l -= 1 }
      else { out(filled) = arr.ids(r); r += 1 }
      filled += 1
    }
    out
  }

  /** Expansion over all arrays (the §4.3 improvement): each array expands
    * independently with its *local* frontier; results are unioned.
    * Returns distinct candidate vector ids.
    *
    * Arrays are independent, so they *can* run concurrently — but thread
    * dispatch costs ~0.3 ms on this JVM, while one array's expansion at
    * our ×1/100 scale costs ~10 µs (the paper's arrays hold millions of
    * string hashkeys, ours thousands of packed Longs). Below
    * [[ESKLSH.MinParallelWork]] total steps the sweep therefore runs as a
    * serial loop; at paper-scale budgets (e.g. Table 3: H ≥ 32, R = 300)
    * the parallel path engages and shows the paper's sublinear-in-H wall
    * time.
    */
  def expandAll(queryKeys: Array[Long], starts: Array[Int], range: Int): Array[Int] = {
    val totalWork = arrays.length.toLong * math.min(range, size)
    val perArray =
      if (totalWork >= ESKLSH.MinParallelWork)
        Parallel.tabulate(arrays.length)(h => expandOne(h, queryKeys(h), starts(h), range))
      else
        Array.tabulate(arrays.length)(h => expandOne(h, queryKeys(h), starts(h), range))
    distinct(perArray)
  }

  /** Original SK-LSH expansion (the baseline this paper improves on):
    * iterative — at every step scan *all* arrays' frontiers and consume the
    * globally closest hashkey by the *original* distance (Eq. 4, KD ≡ 1
    * under binary hashes). Collects `total` candidates overall.
    */
  def expandIterativeGlobal(queryKeys: Array[Long], starts: Array[Int], total: Int): Array[Int] = {
    val hN = arrays.length
    val ls = new Array[Int](hN); val rs = new Array[Int](hN)
    var h = 0
    while (h < hN) {
      val n = arrays(h).length
      rs(h) = math.min(math.max(0, starts(h)), math.max(0, n - 1))
      ls(h) = rs(h) - 1
      h += 1
    }
    val out = new scala.collection.mutable.ArrayBuffer[Int](total)
    var filled = 0
    val capacity = arrays.map(_.length.toLong).sum
    val target = math.min(total.toLong, capacity).toInt
    while (filled < target) {
      var bestH = -1; var bestLeft = false; var bestD = Double.MaxValue
      h = 0
      while (h < hN) {
        val arr = arrays(h)
        if (ls(h) >= 0) {
          val d = Hashkey.distOriginal(arr.key(ls(h)), queryKeys(h), arr.m)
          if (d < bestD) { bestD = d; bestH = h; bestLeft = true }
        }
        if (rs(h) < arr.length) {
          val d = Hashkey.distOriginal(arr.key(rs(h)), queryKeys(h), arr.m)
          if (d < bestD) { bestD = d; bestH = h; bestLeft = false }
        }
        h += 1
      }
      if (bestH < 0) return out.distinct.toArray // all arrays exhausted
      if (bestLeft) { out += arrays(bestH).ids(ls(bestH)); ls(bestH) -= 1 }
      else { out += arrays(bestH).ids(rs(bestH)); rs(bestH) += 1 }
      filled += 1
    }
    out.distinct.toArray
  }

  private def distinct(perArray: Array[Array[Int]]): Array[Int] = {
    val seen = new java.util.HashSet[Int]()
    val out = new scala.collection.mutable.ArrayBuffer[Int]()
    var h = 0
    while (h < perArray.length) {
      val a = perArray(h)
      var i = 0
      while (i < a.length) { if (seen.add(a(i))) out += a(i); i += 1 }
      h += 1
    }
    out.toArray
  }
}

object ESKLSH {

  /** Minimum total expansion steps (arrays × range) before expandAll pays
    * for thread dispatch; below this a serial sweep is faster on every
    * machine we target. See expandAll's doc comment.
    */
  val MinParallelWork = 4096L

  /** Hashes all vectors under `numArrays` compound functions and builds the
    * sorted arrays. Hashing is parallel over vectors (offline build).
    *
    * @param sharedLsh hyperplanes to reuse (truncated to `keyLen`) instead
    *                  of drawing fresh ones — LIDER shares one plane set
    *                  across all in-cluster retrievers (Table 5 memory)
    */
  def build(
      vectors: Array[Array[Float]],
      numArrays: Int,
      keyLen: Int,
      b: Int,
      seed: Long,
      sharedLsh: Option[RandomHyperplaneLSH] = None): ESKLSH = {
    require(vectors.nonEmpty, "ESK-LSH needs vectors")
    val dim = vectors(0).length
    val lsh = sharedLsh match {
      case Some(master) =>
        require(master.dim == dim && master.numKeys == numArrays,
          s"shared LSH shape mismatch: ${master.dim}x${master.numKeys} vs ${dim}x$numArrays")
        master.truncate(keyLen)
      case None => RandomHyperplaneLSH(dim, numArrays, keyLen, seed)
    }
    val perArrayKeys = Array.fill(numArrays)(new Array[Long](vectors.length))
    Parallel.foreachRange(vectors.length) { i =>
      val ks = lsh.hashAll(vectors(i))
      var h = 0
      while (h < numArrays) { perArrayKeys(h)(i) = ks(h); h += 1 }
    }
    val arrays = Parallel.tabulate(numArrays)(h => SortedKeyArray.build(perArrayKeys(h), keyLen))
    new ESKLSH(lsh, arrays, b)
  }

  /** Hashkey length rule from the paper (§6): M = ceil(log2 N), floored at
    * 4 bits for tiny clusters and capped at the packed-Long limit.
    */
  def keyLenFor(n: Int): Int =
    math.min(Hashkey.MaxLen, math.max(4, math.ceil(math.log(math.max(2, n)) / math.log(2)).toInt))
}
