package repro.baselines

import repro.SparkSpec

class HacSpec extends SparkSpec {

  private def mat(rows: Array[Double]*): Array[Array[Double]] = rows.toArray

  test("empty input yields empty labels") {
    assert(Hac.cluster(Array.empty, 0.5).isEmpty)
  }

  test("single point is its own cluster") {
    assert(Hac.cluster(mat(Array(1.0)), 0.5).toSeq === Seq(0))
  }

  test("two similar points merge, two dissimilar don't") {
    val close = mat(Array(1.0, 0.9), Array(0.9, 1.0))
    val far = mat(Array(1.0, 0.1), Array(0.1, 1.0))
    assert(Hac.cluster(close, 0.5).distinct.length === 1)
    assert(Hac.cluster(far, 0.5).distinct.length === 2)
  }

  test("two blocks separate under average linkage") {
    val s = mat(
      Array(1.0, 0.9, 0.1, 0.1),
      Array(0.9, 1.0, 0.1, 0.1),
      Array(0.1, 0.1, 1.0, 0.9),
      Array(0.1, 0.1, 0.9, 1.0),
    )
    val l = Hac.cluster(s, 0.5, Hac.Average)
    assert(l(0) === l(1))
    assert(l(2) === l(3))
    assert(l(0) !== l(2))
  }

  test("single linkage chains, complete linkage resists chaining") {
    // 0-1 similar, 1-2 similar, 0-2 dissimilar.
    val s = mat(
      Array(1.0, 0.8, 0.0),
      Array(0.8, 1.0, 0.8),
      Array(0.0, 0.8, 1.0),
    )
    val single = Hac.cluster(s, 0.5, Hac.Single)
    val complete = Hac.cluster(s, 0.5, Hac.Complete)
    assert(single.distinct.length === 1, "single linkage should chain all three")
    assert(complete.distinct.length === 2, "complete linkage should stop at the weak link")
  }

  test("threshold above all similarities keeps everything separate") {
    val s = mat(Array(1.0, 0.99), Array(0.99, 1.0))
    assert(Hac.cluster(s, 1.5).distinct.length === 2)
  }

  test("labels are dense 0-based") {
    val s = mat(
      Array(1.0, 0.9, 0.0),
      Array(0.9, 1.0, 0.0),
      Array(0.0, 0.0, 1.0),
    )
    val l = Hac.cluster(s, 0.5)
    assert(l.distinct.sorted.toSeq === (0 until l.distinct.length).toSeq)
  }
}
