package repro.lsh

import repro.linalg.VecOps
import scala.util.Random

/** Hyperplane random-projection LSH (Charikar 2002) for cosine similarity —
  * the base LSH model of ESK-LSH (paper §4.1).
  *
  * `numKeys` compound hash functions G_h = (h_1 … h_m), each a sequence of
  * `keyLen` random hyperplanes; `h_i(v) = [v · r_i ≥ 0]`. The collision
  * probability of a single bit is `1 − θ/π` (paper Eq. 2), which the tests
  * verify statistically.
  *
  * `planes(h)(i)` is the i-th hyperplane of compound function h. Construct
  * via the companion: seeded (deterministic Gaussian directions, so index
  * build and query-time hashing agree) or from persisted planes (the
  * DataSource V2 reader path).
  */
final class RandomHyperplaneLSH private[lsh] (
    val dim: Int,
    val numKeys: Int,
    val keyLen: Int,
    val planes: Array[Array[Array[Float]]])
    extends Serializable {
  require(keyLen <= Hashkey.MaxLen, s"keyLen $keyLen > ${Hashkey.MaxLen}")

  /** The packed hashkey of `v` under compound function `h`. */
  def hash(v: Array[Float], h: Int): Long = {
    val ps = planes(h)
    var key = 0L
    var i = 0
    while (i < keyLen) {
      val bit = if (VecOps.dot(v, ps(i)) >= 0.0) 1L else 0L
      key = (key << 1) | bit
      i += 1
    }
    key
  }

  /** All `numKeys` hashkeys of `v`. */
  def hashAll(v: Array[Float]): Array[Long] =
    Array.tabulate(numKeys)(h => hash(v, h))

  /** Signed margins v·r_i of `v` under function `h` — used by the
    * multi-probe LSH baseline to rank which bits to flip first.
    */
  def margins(v: Array[Float], h: Int): Array[Double] =
    Array.tabulate(keyLen)(i => VecOps.dot(v, planes(h)(i)))

  /** A view with the first `m` hyperplanes per compound function. The
    * per-bit plane vectors (the heavy arrays) are *shared*, which is how
    * LIDER keeps one hyperplane set across its ~1000 in-cluster
    * retrievers (per-cluster key lengths differ, plane directions need
    * not — they are data-independent random draws).
    */
  def truncate(m: Int): RandomHyperplaneLSH = {
    require(m <= keyLen, s"cannot truncate to $m > $keyLen")
    if (m == keyLen) this
    else new RandomHyperplaneLSH(dim, numKeys, m, planes.map(_.take(m)))
  }
}

object RandomHyperplaneLSH {

  /** Seeded construction: standard Gaussian hyperplane directions
    * (rotation-invariant), deterministic in `seed`.
    */
  def apply(dim: Int, numKeys: Int, keyLen: Int, seed: Long): RandomHyperplaneLSH = {
    val rnd = new Random(seed)
    val planes = Array.fill(numKeys, keyLen)(Array.fill(dim)(rnd.nextGaussian().toFloat))
    new RandomHyperplaneLSH(dim, numKeys, keyLen, planes)
  }

  /** Reconstruction from persisted hyperplanes (index load path). */
  def fromPlanes(planes: Array[Array[Array[Float]]]): RandomHyperplaneLSH = {
    require(planes.nonEmpty && planes(0).nonEmpty && planes(0)(0).nonEmpty, "empty planes")
    new RandomHyperplaneLSH(planes(0)(0).length, planes.length, planes(0).length, planes)
  }
}
