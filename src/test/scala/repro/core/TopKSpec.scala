package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropertySupport

class TopKSpec extends AnyFunSuite with PropertySupport {

  private val scoredGen: Gen[Array[Scored]] =
    Gen.choose(0, 100).flatMap { n =>
      Gen.listOfN(n, Gen.zip(Gen.choose(0L, 30L), Gen.choose(-1.0, 1.0)))
        .map(_.map { case (id, s) => Scored(id, s) }.toArray)
    }

  test("topBy returns at most k elements, sorted descending by score") {
    checkProp(Prop.forAll(Gen.zip(scoredGen, Gen.choose(1, 20))) { case (xs, k) =>
      val got = TopK.topBy(xs, k)
      got.length == math.min(k, xs.length) &&
        got.sliding(2).forall(p => p.length < 2 || p(0).score >= p(1).score)
    })
  }

  test("topBy matches full sort + take") {
    checkProp(Prop.forAll(Gen.zip(scoredGen, Gen.choose(1, 20))) { case (xs, k) =>
      TopK.topBy(xs, k).toSeq == xs.sorted(TopK.ordering).take(k).toSeq
    })
  }

  test("ties break by ascending id (deterministic)") {
    val xs = Array(Scored(5, 1.0), Scored(2, 1.0), Scored(9, 1.0))
    assert(TopK.topBy(xs, 2).map(_.id).toSeq == Seq(2L, 5L))
  }

  test("mergeSorted of disjoint sorted lists equals global sort") {
    checkProp(Prop.forAll(Gen.choose(1, 5).flatMap { nl =>
      Gen.listOfN(nl, Gen.choose(0, 20)).map { sizes =>
        var nextId = 0L
        sizes.map { sz =>
          Array.fill(sz) { nextId += 1; Scored(nextId, scala.util.Random.nextDouble()) }
            .sorted(TopK.ordering)
        }.toArray
      }
    }) { lists =>
      val k = 10
      val got = TopK.mergeSorted(lists, k)
      val expected = lists.flatten.sorted(TopK.ordering).take(k)
      got.toSeq == expected.toSeq
    })
  }

  test("mergeSorted with k larger than total returns everything") {
    val lists = Array(
      Array(Scored(1, 0.9), Scored(2, 0.5)),
      Array(Scored(3, 0.7)))
    val got = TopK.mergeSorted(lists, 100)
    assert(got.map(_.id).toSeq == Seq(1L, 3L, 2L))
  }

  test("mergeSorted deduplicates overlapping ids, keeping the best-scored") {
    val lists = Array(
      Array(Scored(1, 0.9), Scored(2, 0.5)),
      Array(Scored(1, 0.8), Scored(3, 0.1)))
    val got = TopK.mergeSorted(lists, 10)
    assert(got.map(_.id).toSeq == Seq(1L, 2L, 3L))
    assert(got(0).score == 0.9)
  }

  test("mergeSorted of empty input is empty") {
    assert(TopK.mergeSorted(Array.empty, 5).isEmpty)
    assert(TopK.mergeSorted(Array(Array.empty[Scored]), 5).isEmpty)
  }

  test("topBy with k=0-ish boundary: k=1 returns the single best") {
    val xs = Array(Scored(1, 0.2), Scored(2, 0.9), Scored(3, 0.5))
    assert(TopK.topBy(xs, 1).map(_.id).toSeq == Seq(2L))
  }

  test("ordering sorts by score desc then id asc") {
    val xs = Seq(Scored(2, 0.5), Scored(1, 0.5), Scored(3, 0.9)).sorted(TopK.ordering)
    assert(xs.map(_.id) == Seq(3L, 1L, 2L))
  }
}
