package repro.datasource

import java.io._
import org.scalatest.funsuite.AnyFunSuite
import repro.core.{CoreModel, CoreModelParams}
import repro.retrieval.RetrievalData

class CodecSpec extends AnyFunSuite {

  private lazy val corpus = RetrievalData.corpus(600, 16, seed = 71)
  private lazy val cm = CoreModel.build(corpus.vectors, corpus.ids,
    CoreModelParams(numArrays = 5, rmiWidth = 4, b = 3, r0 = 3))

  private def roundTrip(model: CoreModel): CoreModel = {
    val buf = new ByteArrayOutputStream()
    CoreModelCodec.write(model, new DataOutputStream(buf))
    CoreModelCodec.read(new DataInputStream(new ByteArrayInputStream(buf.toByteArray)))
  }

  test("round-trip preserves sizes and parameters") {
    val got = roundTrip(cm)
    assert(got.size == cm.size)
    assert(got.esklsh.numArrays == cm.esklsh.numArrays)
    assert(got.esklsh.keyLen == cm.esklsh.keyLen)
    assert(got.esklsh.b == cm.esklsh.b)
    assert(got.r0 == cm.r0)
    assert(got.rescaleKeys == cm.rescaleKeys)
  }

  test("round-trip preserves vectors and ids bit-exactly") {
    val got = roundTrip(cm)
    assert(got.globalIds.toSeq == cm.globalIds.toSeq)
    assert(got.vectors.zip(cm.vectors).forall { case (a, b) => a.sameElements(b) })
  }

  test("round-trip preserves sorted arrays") {
    val got = roundTrip(cm)
    for (h <- 0 until cm.esklsh.numArrays) {
      assert(got.esklsh.arrays(h).keys.toSeq == cm.esklsh.arrays(h).keys.toSeq)
      assert(got.esklsh.arrays(h).ids.toSeq == cm.esklsh.arrays(h).ids.toSeq)
    }
  }

  test("round-trip preserves RMI and rescaler parameters") {
    val got = roundTrip(cm)
    for (h <- 0 until cm.esklsh.numArrays) {
      assert(got.rescalers(h) == cm.rescalers(h))
      assert(got.rmis(h).root == cm.rmis(h).root)
      assert(got.rmis(h).leaves.toSeq == cm.rmis(h).leaves.toSeq)
      assert(got.rmis(h).n == cm.rmis(h).n)
    }
  }

  test("a decoded model answers queries identically") {
    val got = roundTrip(cm)
    for (i <- 0 until 20) {
      val q = corpus.vectors(i * 7)
      assert(got.search(q, 10).toSeq == cm.search(q, 10).toSeq)
    }
  }

  test("non-rescaled (ablation) models survive the round-trip") {
    val raw = CoreModel.build(corpus.vectors, corpus.ids,
      CoreModelParams(numArrays = 2, rescaleKeys = false))
    val got = roundTrip(raw)
    assert(!got.rescaleKeys)
    assert(got.search(corpus.vectors(0), 5).toSeq == raw.search(corpus.vectors(0), 5).toSeq)
  }

  test("garbage input is rejected by the magic check") {
    val bytes = Array.fill[Byte](64)(42)
    intercept[IllegalArgumentException](
      CoreModelCodec.read(new DataInputStream(new ByteArrayInputStream(bytes))))
  }
}
