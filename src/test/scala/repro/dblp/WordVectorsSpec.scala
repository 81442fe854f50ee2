package repro.dblp

import repro.SparkSpec
import repro.util.VectorOps

class WordVectorsSpec extends SparkSpec {

  test("vectors are unit length") {
    for (w <- Seq("t0_w1", "t3_w17", "g_w5", "sig_t12_0", "anything")) {
      assert(math.abs(VectorOps.norm(WordVectors.vector(w)) - 1.0) < 1e-9, w)
    }
  }

  test("vectors are deterministic") {
    assert(WordVectors.vector("t0_w1").toSeq === WordVectors.vector("t0_w1").toSeq)
  }

  test("same-topic words are closer than cross-topic words") {
    val sames = for (i <- 1 to 8; j <- (i + 1) to 8)
      yield VectorOps.cosine(WordVectors.vector(s"t0_w$i"), WordVectors.vector(s"t0_w$j"))
    val crosses = for (i <- 1 to 8)
      yield VectorOps.cosine(WordVectors.vector(s"t0_w$i"), WordVectors.vector(s"t5_w$i"))
    val sameMean = sames.sum / sames.size
    val crossMean = crosses.sum / crosses.size
    assert(sameMean > crossMean + 0.2, s"same $sameMean vs cross $crossMean")
  }

  test("global stop-topic words are near-orthogonal to topics on average") {
    val cos = for (i <- 1 to 12)
      yield math.abs(VectorOps.cosine(WordVectors.vector(s"g_w$i"), WordVectors.topicDirection(0)))
    assert(cos.sum / cos.size < 0.4)
  }

  test("different words of one topic are not identical") {
    assert(WordVectors.vector("t1_w1").toSeq !== WordVectors.vector("t1_w2").toSeq)
  }

  test("topic directions are unit and distinct") {
    val d0 = WordVectors.topicDirection(0)
    val d1 = WordVectors.topicDirection(1)
    assert(math.abs(VectorOps.norm(d0) - 1.0) < 1e-9)
    assert(VectorOps.cosine(d0, d1) < 0.99)
  }

  test("signature words cluster by team key") {
    val a = WordVectors.vector("sig_t7_0")
    val b = WordVectors.vector("sig_t7_1")
    val c = WordVectors.vector("sig_t8_0")
    assert(VectorOps.cosine(a, b) > VectorOps.cosine(a, c))
  }
}
