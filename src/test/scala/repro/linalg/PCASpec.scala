package repro.linalg

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PCASpec extends AnyFunSuite {

  /** Sample stretched along a known direction plus small isotropic noise. */
  private def anisotropic(n: Int, dim: Int, axis: Int, stretch: Double, seed: Long): Array[Array[Float]] = {
    val rnd = new Random(seed)
    Array.fill(n) {
      val v = Array.fill(dim)((rnd.nextGaussian() * 0.1).toFloat)
      v(axis) = (v(axis) + rnd.nextGaussian() * stretch).toFloat
      v
    }
  }

  test("leading component aligns with the dominant variance direction") {
    val data = anisotropic(500, 8, axis = 3, stretch = 5.0, seed = 1)
    val pca = PCA.fit(data, 1)
    val comp = Array.tabulate(8)(j => pca.components(0, j))
    assert(math.abs(comp(3)) > 0.95, s"component = ${comp.toSeq}")
  }

  test("transform output has the requested dimension") {
    val data = anisotropic(200, 6, 0, 2.0, 2)
    val pca = PCA.fit(data, 3)
    assert(pca.transform(data(0)).length == 3)
    assert(pca.outputDim == 3)
  }

  test("projection onto all components preserves pairwise distances") {
    val data = anisotropic(100, 5, 1, 2.0, 3)
    val pca = PCA.fit(data, 5)
    val a = data(0); val b = data(1)
    val orig = VecOps.sqDist(a, b)
    val proj = VecOps.sqDist(pca.transform(a), pca.transform(b))
    assert(math.abs(orig - proj) / math.max(orig, 1e-9) < 1e-3)
  }

  test("projection variance is concentrated in leading components") {
    val data = anisotropic(400, 6, 2, 4.0, 4)
    val pca = PCA.fit(data, 6)
    val proj = data.map(pca.transform)
    def variance(c: Int): Double = {
      val xs = proj.map(_(c).toDouble)
      val m = xs.sum / xs.length
      xs.map(x => (x - m) * (x - m)).sum / xs.length
    }
    val vs = Array.tabulate(6)(variance)
    assert(vs.sliding(2).forall(p => p(0) >= p(1) - 1e-6), s"variances = ${vs.toSeq}")
  }

  test("transform of the mean vector is (approximately) the origin") {
    val data = anisotropic(300, 4, 0, 1.0, 5)
    val pca = PCA.fit(data, 2)
    val meanVec = pca.mean.map(_.toFloat)
    val t = pca.transform(meanVec)
    assert(t.forall(x => math.abs(x) < 1e-5))
  }

  test("outDim larger than dim is rejected") {
    intercept[IllegalArgumentException](PCA.fit(anisotropic(50, 3, 0, 1.0, 6), 4))
  }

  test("empty sample is rejected") {
    intercept[IllegalArgumentException](PCA.fit(Array.empty[Array[Float]], 1))
  }
}
