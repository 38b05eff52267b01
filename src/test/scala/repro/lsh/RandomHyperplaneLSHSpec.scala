package repro.lsh

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.VecOps
import scala.util.Random

class RandomHyperplaneLSHSpec extends AnyFunSuite {

  private def unit(dim: Int, rnd: Random): Array[Float] =
    VecOps.normalized(Array.fill(dim)(rnd.nextGaussian().toFloat))

  /** A unit vector at angle `theta` from `a` (in the plane spanned with a
    * random helper direction).
    */
  private def atAngle(a: Array[Float], theta: Double, rnd: Random): Array[Float] = {
    val helper = unit(a.length, rnd)
    val proj = VecOps.dot(helper, a)
    val orth = VecOps.normalized(Array.tabulate(a.length)(i => (helper(i) - proj * a(i)).toFloat))
    Array.tabulate(a.length)(i => (math.cos(theta) * a(i) + math.sin(theta) * orth(i)).toFloat)
  }

  test("hashing is deterministic in the seed") {
    val l1 = RandomHyperplaneLSH(16, 4, 10, seed = 3)
    val l2 = RandomHyperplaneLSH(16, 4, 10, seed = 3)
    val v = unit(16, new Random(1))
    assert(l1.hashAll(v).toSeq == l2.hashAll(v).toSeq)
  }

  test("different seeds give different hyperplanes") {
    val l1 = RandomHyperplaneLSH(16, 4, 10, seed = 3)
    val l2 = RandomHyperplaneLSH(16, 4, 10, seed = 4)
    val v = unit(16, new Random(1))
    assert(l1.hashAll(v).toSeq != l2.hashAll(v).toSeq)
  }

  test("a vector collides with itself on every bit") {
    val l = RandomHyperplaneLSH(16, 8, 12, seed = 5)
    val v = unit(16, new Random(2))
    assert(l.hash(v, 0) == l.hash(v.clone(), 0))
  }

  test("bit collision probability tracks 1 - theta/pi (paper Eq. 2)") {
    val dim = 24
    val rnd = new Random(7)
    val l = RandomHyperplaneLSH(dim, 200, 10, seed = 11) // 2000 independent bits
    for (theta <- Seq(0.3, 0.8, 1.5)) {
      var agree = 0; var total = 0
      for (_ <- 0 until 20) {
        val a = unit(dim, rnd)
        val b = atAngle(a, theta, rnd)
        for (h <- 0 until 200) {
          val ka = l.hash(a, h); val kb = l.hash(b, h)
          agree += 10 - java.lang.Long.bitCount(ka ^ kb)
          total += 10
        }
      }
      val got = agree.toDouble / total
      val expected = 1.0 - theta / math.Pi
      assert(math.abs(got - expected) < 0.03, s"theta=$theta got=$got expected=$expected")
    }
  }

  test("collision probability decreases with angle (locality sensitivity)") {
    val dim = 24
    val rnd = new Random(13)
    val l = RandomHyperplaneLSH(dim, 100, 10, seed = 17)
    def agreeFrac(theta: Double): Double = {
      var agree = 0; var total = 0
      for (_ <- 0 until 30) {
        val a = unit(dim, rnd); val b = atAngle(a, theta, rnd)
        for (h <- 0 until 100) {
          agree += 10 - java.lang.Long.bitCount(l.hash(a, h) ^ l.hash(b, h)); total += 10
        }
      }
      agree.toDouble / total
    }
    val f1 = agreeFrac(0.2); val f2 = agreeFrac(1.0); val f3 = agreeFrac(2.2)
    assert(f1 > f2 && f2 > f3, s"$f1, $f2, $f3")
  }

  test("margins' signs match the hashed bits") {
    val l = RandomHyperplaneLSH(8, 2, 6, seed = 19)
    val v = unit(8, new Random(3))
    for (h <- 0 until 2) {
      val key = l.hash(v, h)
      val ms = l.margins(v, h)
      for (i <- 0 until 6)
        assert((ms(i) >= 0) == (Hashkey.bitAt(key, i, 6) == 1), s"h=$h bit=$i")
    }
  }

  test("fromPlanes reproduces the same hashes") {
    val l = RandomHyperplaneLSH(12, 3, 8, seed = 23)
    val copy = RandomHyperplaneLSH.fromPlanes(l.planes)
    val v = unit(12, new Random(4))
    assert(copy.dim == 12 && copy.numKeys == 3 && copy.keyLen == 8)
    assert(l.hashAll(v).toSeq == copy.hashAll(v).toSeq)
  }

  test("keyLen beyond the packed-Long limit is rejected") {
    intercept[IllegalArgumentException](RandomHyperplaneLSH(8, 1, 63, seed = 1))
  }
}
