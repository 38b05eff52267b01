package repro.rmi

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropertySupport

class KeyRescalerSpec extends AnyFunSuite with PropertySupport {

  private val keysGen: Gen[Array[Long]] =
    Gen.choose(2, 100).flatMap(n => Gen.listOfN(n, Gen.choose(0L, 1L << 40)).map(_.toArray))

  test("min maps to 0 and max maps to L-1 (paper Eq. 8 with a=0, b=L-1)") {
    val r = KeyRescaler.fit(Array(10L, 20L, 100L), arrayLen = 3)
    assert(r.rescale(10L) == 0.0)
    assert(r.rescale(100L) == 2.0)
  }

  test("fit finds the true min and max") {
    checkProp(Prop.forAll(keysGen) { ks =>
      val r = KeyRescaler.fit(ks, ks.length.toLong)
      r.min == ks.min && r.max == ks.max
    })
  }

  test("rescaled training keys stay within [0, L-1]") {
    checkProp(Prop.forAll(keysGen) { ks =>
      val r = KeyRescaler.fit(ks, ks.length.toLong)
      ks.forall { k =>
        val x = r.rescale(k)
        x >= 0.0 && x <= (ks.length - 1).toDouble + 1e-9
      }
    })
  }

  test("rescaling is monotone (preserves sorted order)") {
    checkProp(Prop.forAll(keysGen) { ks =>
      val r = KeyRescaler.fit(ks, ks.length.toLong)
      val sorted = ks.sorted
      sorted.sliding(2).forall(p => p.length < 2 || r.rescale(p(0)) <= r.rescale(p(1)))
    })
  }

  test("rescaling is linear in the key") {
    val r = KeyRescaler(min = 0L, max = 1000L, arrayLen = 101)
    assert(r.rescale(500L) == 50.0)
    assert(r.rescale(250L) == 25.0)
  }

  test("query keys outside [min,max] extrapolate without clamping") {
    val r = KeyRescaler(min = 100L, max = 200L, arrayLen = 11)
    assert(r.rescale(300L) == 20.0)
    assert(r.rescale(0L) == -10.0)
  }

  test("all-identical keys map to 0 (degenerate range)") {
    val r = KeyRescaler.fit(Array(7L, 7L, 7L), 3)
    assert(r.rescale(7L) == 0.0)
    assert(r.rescale(1234L) == 0.0)
  }

  test("fit on empty keys rejected") {
    intercept[IllegalArgumentException](KeyRescaler.fit(Array.empty[Long], 0))
  }
}
