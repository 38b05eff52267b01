package repro.esklsh

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropertySupport

class SortedKeyArraySpec extends AnyFunSuite with PropertySupport {

  private val keysGen: Gen[Array[Long]] =
    Gen.choose(1, 200).flatMap(n => Gen.listOfN(n, Gen.choose(0L, 255L)).map(_.toArray))

  test("keys come out ascending") {
    checkProp(Prop.forAll(keysGen) { ks =>
      val arr = SortedKeyArray.build(ks, 8)
      arr.keys.sliding(2).forall(p => p.length < 2 || p(0) <= p(1))
    })
  }

  test("ids permute the input exactly") {
    checkProp(Prop.forAll(keysGen) { ks =>
      val arr = SortedKeyArray.build(ks, 8)
      arr.ids.sorted.toSeq == ks.indices.toSeq
    })
  }

  test("each position's key matches the input key of its id") {
    checkProp(Prop.forAll(keysGen) { ks =>
      val arr = SortedKeyArray.build(ks, 8)
      arr.keys.indices.forall(i => arr.keys(i) == ks(arr.ids(i)))
    })
  }

  test("equal keys keep ascending id order (deterministic ties)") {
    val arr = SortedKeyArray.build(Array(5L, 5L, 1L, 5L), 4)
    assert(arr.keys.toSeq == Seq(1L, 5L, 5L, 5L))
    assert(arr.ids.toSeq == Seq(2, 0, 1, 3))
  }

  test("insertionPoint returns the first position with key >= query") {
    val arr = SortedKeyArray.build(Array(2L, 4L, 4L, 9L), 4)
    assert(arr.insertionPoint(0L) == 0)
    assert(arr.insertionPoint(2L) == 0)
    assert(arr.insertionPoint(3L) == 1)
    assert(arr.insertionPoint(4L) == 1)
    assert(arr.insertionPoint(5L) == 3)
    assert(arr.insertionPoint(10L) == 4)
  }

  test("insertionPoint brackets the query key") {
    checkProp(Prop.forAll(for {
      ks <- keysGen
      q <- Gen.choose(0L, 255L)
    } yield (ks, q)) { case (ks, q) =>
      val arr = SortedKeyArray.build(ks, 8)
      val p = arr.insertionPoint(q)
      (p == 0 || arr.keys(p - 1) < q) && (p == arr.length || arr.keys(p) >= q)
    })
  }

  test("length mismatch is rejected") {
    intercept[IllegalArgumentException](SortedKeyArray.fromSorted(Array(1L), Array(0, 1), 4))
  }

  test("bit-packed storage round-trips keys exactly (including word-boundary splits)") {
    checkProp(Prop.forAll(for {
      m <- Gen.choose(2, 62)
      n <- Gen.choose(1, 80)
      ks <- Gen.listOfN(n, Gen.choose(0L, (1L << m) - 1))
    } yield (m, ks.sorted.toArray)) { case (m, sorted) =>
      val arr = SortedKeyArray.fromSorted(sorted, Array.tabulate(sorted.length)(identity), m)
      (0 until sorted.length).forall(i => arr.key(i) == sorted(i))
    })
  }

  test("sizeBytes scales with the key length") {
    val ks = Array.tabulate(100)(_.toLong)
    val small = SortedKeyArray.build(ks, 8)
    val large = SortedKeyArray.build(ks, 32)
    assert(small.sizeBytes < large.sizeBytes)
    // ids are 4B each; packed keys are mB/8 each (rounded to words).
    assert(small.sizeBytes >= 100 * 4 + 100 * 8 / 8)
  }

  test("single-element array works") {
    val arr = SortedKeyArray.build(Array(7L), 4)
    assert(arr.length == 1 && arr.insertionPoint(7L) == 0 && arr.insertionPoint(8L) == 1)
  }
}
