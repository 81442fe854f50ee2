package repro.exp

import repro.SparkSpec

/** Harness smoke tests at tiny scale — the real numbers come from
  * `bench/test`; here we verify the plumbing of every table generator.
  */
class ExperimentsSpec extends SparkSpec {

  private lazy val c = Experiments.corpus(spark, sf = 0.003, seed = 42L)

  test("corpus materialises papers, authorships and eval names") {
    assert(c.papers.count() > 0)
    assert(c.auth.count() > c.papers.count()) // multi-author papers exist
    assert(c.evalNames.count() >= 5)
  }

  test("subsample keeps roughly the requested fraction") {
    val half = Experiments.subsample(c, 0.5)
    val ratio = half.papers.count().toDouble / c.papers.count()
    assert(ratio > 0.35 && ratio < 0.65, s"ratio $ratio")
    // subsampling is consistent between papers and authorships
    assert(half.auth.select("pid").distinct().count() === half.papers.count())
  }

  test("subsample at fraction 1.0 is identity") {
    assert(Experiments.subsample(c, 1.0).papers.count() === c.papers.count())
  }

  test("tableII reports per-name author and paper counts") {
    val t = Experiments.tableII(spark, c).collect()
    assert(t.nonEmpty)
    t.foreach { r =>
      assert(r.getLong(1) >= 2, s"eval name ${r.getString(0)} not ambiguous")
      assert(r.getLong(2) >= r.getLong(1), "papers >= authors per name")
    }
  }

  test("runIuad returns SCN and GCN metrics with the Table IV ordering") {
    val (_, scn, gcn) = Experiments.runIuad(spark, c)
    assert(scn.precision > gcn.precision - 0.15)
    assert(gcn.recall >= scn.recall)
    assert(gcn.f1 >= scn.f1 - 1e-9)
  }

  test("runUnsupervised returns metrics and positive per-name seconds") {
    val (m, secs) = Experiments.runUnsupervised(spark, c, repro.baselines.Unsupervised.Anon())
    assert(m.tp + m.fp + m.fn + m.tn > 0)
    assert(secs > 0.0)
  }

  test("runSupervised covers all labelled pairs") {
    val m = Experiments.runSupervised(spark, c, "rf")
    assert(m.tp + m.fp + m.fn + m.tn > 0)
  }

  test("tableVI produces rows with timing") {
    val rows = Experiments.tableVI(spark, c, sizes = Seq(20))
    assert(rows.length === 1)
    assert(rows.head.nNew === 20)
    assert(rows.head.avgMsPerPaper > 0.0)
    assert(rows.head.base.tp + rows.head.base.tn > 0)
  }

  test("dataScaleQuality returns one row per fraction") {
    val q = Experiments.dataScaleQuality(spark, c, Seq(0.5, 1.0))
    assert(q.map(_._1) === Seq(0.5, 1.0))
  }

  test("fmtMetrics renders all four micro measures") {
    val s = Experiments.fmtMetrics("x", repro.core.Model.Metrics(1, 1, 1, 1))
    assert(s.contains("MicroA") && s.contains("MicroP") && s.contains("MicroR") && s.contains("MicroF"))
  }
}
