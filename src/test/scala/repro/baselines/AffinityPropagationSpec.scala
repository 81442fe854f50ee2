package repro.baselines

import repro.SparkSpec

class AffinityPropagationSpec extends SparkSpec {

  test("degenerate sizes") {
    assert(AffinityPropagation.cluster(Array.empty).isEmpty)
    assert(AffinityPropagation.cluster(Array(Array(0.0))).toSeq === Seq(0))
  }

  test("two well-separated blocks are recovered") {
    val s = Array(
      Array(0.0, -0.1, -5.0, -5.0),
      Array(-0.1, 0.0, -5.0, -5.0),
      Array(-5.0, -5.0, 0.0, -0.1),
      Array(-5.0, -5.0, -0.1, 0.0),
    )
    val l = AffinityPropagation.cluster(s)
    assert(l(0) === l(1))
    assert(l(2) === l(3))
    assert(l(0) !== l(2))
  }

  test("uniform similarities collapse to one exemplar with high preference... or stay apart with low") {
    val s = Array.tabulate(4, 4)((i, j) => if (i == j) 0.0 else -0.1)
    val one = AffinityPropagation.cluster(s, preference = Some(-10.0))
    assert(one.distinct.length === 1, s"${one.toSeq}")
    val many = AffinityPropagation.cluster(s, preference = Some(10.0))
    assert(many.distinct.length === 4, s"${many.toSeq}")
  }

  test("labels are dense and total") {
    val s = Array.tabulate(6, 6)((i, j) => if (i / 3 == j / 3) -0.1 else -8.0)
    val l = AffinityPropagation.cluster(s)
    assert(l.length === 6)
    assert(l.distinct.sorted.toSeq === (0 until l.distinct.length).toSeq)
  }

  test("deterministic across calls") {
    val s = Array.tabulate(5, 5)((i, j) => -math.abs(i - j).toDouble)
    assert(AffinityPropagation.cluster(s).toSeq === AffinityPropagation.cluster(s).toSeq)
  }
}
