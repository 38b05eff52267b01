package repro.baselines

import repro.linalg.VecOps
import scala.util.Random

/** Hierarchical Navigable Small World graph (Malkov & Yashunin, paper
  * ref. [26]) — built from scratch as the substrate of the IVFPQ-HNSW
  * baseline, where it serves coarse-centroid assignment (paper §7.1.2:
  * "uses HNSW to do the cluster assignment ... for the inverted index").
  *
  * Distances are squared L2 (coarse assignment metric of IVF). Standard
  * construction: geometric level draw, greedy descent on upper layers,
  * ef-bounded best-first search with bidirectional linking and neighbor
  * pruning on the insertion layers.
  */
final class HNSW(
    val vectors: Array[Array[Float]],
    val m: Int,
    val efConstruction: Int,
    seed: Long) {

  private val mMax0 = 2 * m
  private val levelMult = 1.0 / math.log(m.toDouble)
  private val rnd = new Random(seed)

  // neighbors(level)(node) — adjacency lists; level 0 holds every node.
  private val neighbors = scala.collection.mutable.ArrayBuffer[Array[scala.collection.mutable.ArrayBuffer[Int]]]()
  private val nodeLevel = new Array[Int](vectors.length)
  private var entryPoint = -1
  private var maxLevel = -1

  vectors.indices.foreach(insert)

  private def dist(a: Int, q: Array[Float]): Double = VecOps.sqDist(vectors(a), q)

  private def randomLevel(): Int =
    math.min(32, (-math.log(math.max(1e-12, rnd.nextDouble())) * levelMult).toInt)

  private def ensureLevel(l: Int): Unit = {
    while (neighbors.length <= l)
      neighbors += Array.fill(vectors.length)(new scala.collection.mutable.ArrayBuffer[Int])
  }

  /** Best-first search at one level; returns up to ef closest (dist, node). */
  private def searchLayer(q: Array[Float], entry: Int, ef: Int, level: Int): Array[(Double, Int)] = {
    val visited = new java.util.HashSet[Int]()
    val candidates = new java.util.PriorityQueue[(Double, Int)]((a, b) => java.lang.Double.compare(a._1, b._1))
    val best = new java.util.PriorityQueue[(Double, Int)]((a, b) => java.lang.Double.compare(b._1, a._1))
    val d0 = dist(entry, q)
    candidates.offer((d0, entry)); best.offer((d0, entry)); visited.add(entry)
    while (!candidates.isEmpty) {
      val (cd, cn) = candidates.poll()
      if (cd > best.peek()._1 && best.size >= ef) {
        candidates.clear()
      } else {
        val adj = neighbors(level)(cn)
        var i = 0
        while (i < adj.length) {
          val nb = adj(i)
          if (visited.add(nb)) {
            val d = dist(nb, q)
            if (best.size < ef || d < best.peek()._1) {
              candidates.offer((d, nb))
              best.offer((d, nb))
              if (best.size > ef) best.poll()
            }
          }
          i += 1
        }
      }
    }
    val out = new Array[(Double, Int)](best.size)
    var j = out.length - 1
    while (j >= 0) { out(j) = best.poll(); j -= 1 }
    out // ascending by distance
  }

  private def insert(node: Int): Unit = {
    val level = randomLevel()
    nodeLevel(node) = level
    ensureLevel(level)
    if (entryPoint < 0) { entryPoint = node; maxLevel = level; return }

    val q = vectors(node)
    var ep = entryPoint
    // Greedy descent with ef = 1 above the insertion level.
    var l = maxLevel
    while (l > level) {
      ep = searchLayer(q, ep, 1, l)(0)._2
      l -= 1
    }
    // Link on each level from min(level, maxLevel) down to 0.
    l = math.min(level, maxLevel)
    while (l >= 0) {
      val found = searchLayer(q, ep, efConstruction, l)
      val cap = if (l == 0) mMax0 else m
      val selected = found.take(m).map(_._2)
      selected.foreach { nb =>
        neighbors(l)(node) += nb
        val back = neighbors(l)(nb)
        back += node
        if (back.length > cap) {
          // Prune to the cap closest neighbors of nb.
          val pruned = back.toArray.distinct
            .map(x => (VecOps.sqDist(vectors(nb), vectors(x)), x))
            .sortBy(_._1)
            .take(cap)
            .map(_._2)
          back.clear(); back ++= pruned
        }
      }
      if (found.nonEmpty) ep = found(0)._2
      l -= 1
    }
    if (level > maxLevel) { maxLevel = level; entryPoint = node }
  }

  /** The `k` (approximately) nearest vector indices to `q` by L2. */
  def searchKnn(q: Array[Float], k: Int, ef: Int): Array[Int] = {
    if (entryPoint < 0) return Array.emptyIntArray
    var ep = entryPoint
    var l = maxLevel
    while (l > 0) { ep = searchLayer(q, ep, 1, l)(0)._2; l -= 1 }
    searchLayer(q, ep, math.max(ef, k), 0).take(k).map(_._2)
  }
}
