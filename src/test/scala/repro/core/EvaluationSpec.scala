package repro.core

import repro.{Oracle, SparkSpec}
import repro.core.Model.Metrics

class EvaluationSpec extends SparkSpec {
  import spark.implicits._

  test("Metrics ratios match their definitions") {
    val m = Metrics(tp = 6, fp = 2, fn = 3, tn = 9)
    assert(m.accuracy === 15.0 / 20.0)
    assert(m.precision === 6.0 / 8.0)
    assert(m.recall === 6.0 / 9.0)
    val p = m.precision; val r = m.recall
    assert(math.abs(m.f1 - 2 * p * r / (p + r)) < 1e-12)
  }

  test("Metrics handles empty denominators") {
    val m = Metrics(0, 0, 0, 0)
    assert(m.accuracy === 0.0)
    assert(m.precision === 0.0)
    assert(m.recall === 0.0)
    assert(m.f1 === 0.0)
  }

  test("Metrics addition is componentwise") {
    assert(Metrics(1, 2, 3, 4) + Metrics(10, 20, 30, 40) === Metrics(11, 22, 33, 44))
  }

  test("ambiguousNames keeps only names with >= 2 true authors") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "a", 101L),
      (3L, "b", 200L), (4L, "b", 200L),
    ).toDF("pid", "name", "authorId")
    val names = Evaluation.ambiguousNames(truth).as[String].collect().toSeq
    assert(names === Seq("a"))
  }

  test("perfect assignment gives perfect metrics") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "a", 100L), (3L, "a", 101L),
    ).toDF("pid", "name", "authorId")
    val assign = Seq(
      (1L, "a", "c1"), (2L, "a", "c1"), (3L, "a", "c2"),
    ).toDF("pid", "name", "cluster")
    val m = Evaluation.pairwiseMicro(spark, assign, truth)
    assert(m === Metrics(1, 0, 0, 2))
    assert(m.f1 === 1.0)
  }

  test("all-singleton assignment has zero recall but perfect TN") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "a", 100L), (3L, "a", 101L),
    ).toDF("pid", "name", "authorId")
    val assign = Seq(
      (1L, "a", "s1"), (2L, "a", "s2"), (3L, "a", "s3"),
    ).toDF("pid", "name", "cluster")
    val m = Evaluation.pairwiseMicro(spark, assign, truth)
    assert(m === Metrics(0, 0, 1, 2))
    assert(m.recall === 0.0)
  }

  test("all-merged assignment has perfect recall, poor precision") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "a", 100L), (3L, "a", 101L),
    ).toDF("pid", "name", "authorId")
    val assign = Seq(
      (1L, "a", "c"), (2L, "a", "c"), (3L, "a", "c"),
    ).toDF("pid", "name", "cluster")
    val m = Evaluation.pairwiseMicro(spark, assign, truth)
    assert(m === Metrics(1, 2, 0, 0))
    assert(m.recall === 1.0)
    assert(m.precision === 1.0 / 3.0)
  }

  test("pairs never cross names (micro counts are per-name pairs)") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "b", 100L),
    ).toDF("pid", "name", "authorId")
    val assign = Seq(
      (1L, "a", "c"), (2L, "b", "c"),
    ).toDF("pid", "name", "cluster")
    val m = Evaluation.pairwiseMicro(spark, assign, truth)
    assert(m === Metrics(0, 0, 0, 0))
  }

  test("evalNames restriction filters the counted pairs") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "a", 100L),
      (3L, "b", 200L), (4L, "b", 201L),
    ).toDF("pid", "name", "authorId")
    val assign = Seq(
      (1L, "a", "c1"), (2L, "a", "c1"),
      (3L, "b", "c2"), (4L, "b", "c2"),
    ).toDF("pid", "name", "cluster")
    val only = Seq("b").toDF("name")
    val m = Evaluation.pairwiseMicro(spark, assign, truth, Some(only))
    assert(m === Metrics(0, 1, 0, 0))
  }

  test("oracle: pair counting agrees with DuckDB on a small case") {
    val truth = Seq(
      (1L, "a", 100L), (2L, "a", 100L), (3L, "a", 101L), (4L, "a", 101L),
    ).toDF("pid", "name", "authorId")
    val assign = Seq(
      (1L, "a", "x"), (2L, "a", "x"), (3L, "a", "x"), (4L, "a", "y"),
    ).toDF("pid", "name", "cluster")
    val m = Evaluation.pairwiseMicro(spark, assign, truth)
    // Cross-check the TP count via DuckDB on the joined pair table.
    val joined = assign.join(truth, Seq("pid", "name")).select("pid", "name", "cluster", "authorId")
    val tpDf = Seq(m.tp).toDF("tp")
    Oracle.assertEquivalent(
      tpDf,
      """SELECT count(*) AS tp FROM j l JOIN j r
        |ON l.name = r.name AND CAST(l.pid AS BIGINT) < CAST(r.pid AS BIGINT)
        |AND l.cluster = r.cluster AND l.authorId = r.authorId""".stripMargin,
      "j" -> joined,
    )
  }
}
