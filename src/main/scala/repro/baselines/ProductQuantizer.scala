package repro.baselines

import repro.kmeans.KMeans
import repro.linalg.VecOps

/** Product quantization substrate (Jégou et al., paper ref. [11]) shared
  * by the PQ / OPQ / PCA-PQ / IVFPQ baselines.
  *
  * The input dimension is split into `m` contiguous segments; each segment
  * has its own 2^bits-centroid codebook trained by k-means on a sample. A
  * vector is encoded as `m` codebook indices; asymmetric distance
  * computation (ADC) scores encoded vectors against a query through
  * per-segment lookup tables.
  */
final class ProductQuantizer(val codebooks: Array[Array[Array[Float]]]) extends Serializable {
  val m: Int = codebooks.length
  val ksub: Int = codebooks(0).length
  val segDim: Int = codebooks(0)(0).length
  val dim: Int = m * segDim

  private def segment(v: Array[Float], s: Int): Array[Float] = {
    val out = new Array[Float](segDim)
    System.arraycopy(v, s * segDim, out, 0, segDim)
    out
  }

  /** Nearest codebook entry per segment (squared L2, as in [11]). */
  def encode(v: Array[Float]): Array[Byte] = {
    require(v.length == dim, s"dim mismatch ${v.length} vs $dim")
    val codes = new Array[Byte](m)
    var s = 0
    while (s < m) {
      val seg = segment(v, s)
      var best = 0; var bestD = Double.MaxValue
      var c = 0
      while (c < ksub) {
        val d = VecOps.sqDist(seg, codebooks(s)(c))
        if (d < bestD) { bestD = d; best = c }
        c += 1
      }
      codes(s) = best.toByte
      s += 1
    }
    codes
  }

  /** Reconstruction from codes (used by OPQ's alternating optimization). */
  def decode(codes: Array[Byte]): Array[Float] = {
    val out = new Array[Float](dim)
    var s = 0
    while (s < m) {
      val cb = codebooks(s)(codes(s) & 0xff)
      System.arraycopy(cb, 0, out, s * segDim, segDim)
      s += 1
    }
    out
  }

  /** Inner-product ADC tables: lut(s)(c) = q_s · codebook(s)(c). */
  def lutIP(q: Array[Float]): Array[Array[Float]] = {
    val lut = Array.ofDim[Float](m, ksub)
    var s = 0
    while (s < m) {
      val seg = segment(q, s)
      var c = 0
      while (c < ksub) { lut(s)(c) = VecOps.dot(seg, codebooks(s)(c)).toFloat; c += 1 }
      s += 1
    }
    lut
  }

  /** Squared-L2 ADC tables: lut(s)(c) = ||q_s − codebook(s)(c)||². */
  def lutL2(q: Array[Float]): Array[Array[Float]] = {
    val lut = Array.ofDim[Float](m, ksub)
    var s = 0
    while (s < m) {
      val seg = segment(q, s)
      var c = 0
      while (c < ksub) { lut(s)(c) = VecOps.sqDist(seg, codebooks(s)(c)).toFloat; c += 1 }
      s += 1
    }
    lut
  }

  /** ADC score of one encoded vector given precomputed tables. */
  def adc(lut: Array[Array[Float]], codes: Array[Byte], offset: Int): Double = {
    var s = 0; var acc = 0.0
    while (s < m) { acc += lut(s)(codes(offset + s) & 0xff); s += 1 }
    acc
  }

  /** Mean squared reconstruction error over a sample (tests + OPQ). */
  def reconstructionError(sample: Array[Array[Float]]): Double = {
    var s = 0.0
    sample.foreach(v => s += VecOps.sqDist(v, decode(encode(v))))
    s / sample.length
  }
}

object ProductQuantizer {

  /** Trains per-segment codebooks on (a sample of) the corpus.
    *
    * @param bits codebook size is 2^bits, capped at the sample size
    */
  def fit(
      sample: Array[Array[Float]],
      m: Int,
      bits: Int,
      iters: Int = 10,
      seed: Long = 23L): ProductQuantizer = {
    require(sample.nonEmpty)
    val dim = sample(0).length
    require(dim % m == 0, s"dim $dim not divisible by m=$m")
    val segDim = dim / m
    val ksub = math.min(1 << bits, sample.length)
    val codebooks = repro.linalg.Parallel.tabulate(m) { s =>
      val segs = sample.map { v =>
        val out = new Array[Float](segDim)
        System.arraycopy(v, s * segDim, out, 0, segDim)
        out
      }
      KMeans.fit(segs, ksub, iters, seed + s).centroids
    }
    new ProductQuantizer(codebooks)
  }
}
