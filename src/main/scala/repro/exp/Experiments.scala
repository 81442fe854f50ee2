package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.core.Model.Metrics
import repro.baselines._
import repro.dblp.DblpSynth

/** Shared harness for the paper's evaluation tables (II–VI). Jobs under
  * `jobs/` and the bench suites under `bench/` are thin wrappers that call
  * these and print paper-vs-measured rows (recorded in EXPERIMENTS.md).
  */
object Experiments {

  final case class Corpus(
      papers: DataFrame,
      auth: DataFrame,
      evalNames: DataFrame,
      cfg: DblpSynth.Config,
  )

  def corpus(spark: SparkSession, sf: Double, seed: Long = 42L): Corpus = {
    val cfg = DblpSynth.Config(sf = sf, seed = seed)
    val (p, a) = DblpSynth.generate(spark, cfg)
    val papers = p.cache(); val auth = a.cache()
    papers.count(); auth.count() // materialise before timing anything
    Corpus(papers, auth, Evaluation.ambiguousNames(auth).cache(), cfg)
  }

  /** Deterministic paper subsample (Table V / Fig 5 data-scale axis). */
  def subsample(c: Corpus, fraction: Double): Corpus = {
    if (fraction >= 1.0) return c
    val keep = c.papers
      .filter(pmod(hash(col("pid"), lit(17)), lit(1000)) < (fraction * 1000).toInt)
      .select("pid")
    val papers = c.papers.join(keep, Seq("pid")).cache()
    val auth = c.auth.join(keep, Seq("pid")).cache()
    papers.count(); auth.count()
    Corpus(papers, auth, Evaluation.ambiguousNames(auth).cache(), c.cfg)
  }

  // ---------------------------------------------------------------- Table II

  /** Descriptive statistics of the testing (ambiguous-name) subset: per name,
    * the number of true authors and papers — the analogue of Table II.
    */
  def tableII(spark: SparkSession, c: Corpus): DataFrame = {
    c.auth
      .join(c.evalNames, Seq("name"))
      .groupBy("name")
      .agg(
        countDistinct("authorId").as("authors_td"),
        countDistinct("pid").as("papers_td"),
      )
      .orderBy(desc("authors_td"), col("name"))
  }

  // --------------------------------------------------------------- Table III

  final case class NamedMetrics(algorithm: String, group: String, m: Metrics)

  def runIuad(spark: SparkSession, c: Corpus, cfg: Iuad.Config = Iuad.Config()): (Iuad.Result, Metrics, Metrics) = {
    val r = Iuad.run(spark, c.papers, c.auth, cfg)
    val scn = Evaluation.pairwiseMicro(spark, r.scnAssignment, c.auth, Some(c.evalNames))
    val gcn = Evaluation.pairwiseMicro(spark, r.assignment, c.auth, Some(c.evalNames))
    (r, scn, gcn)
  }

  def unsupervisedClusterers: Seq[Baselines.NameClusterer] =
    Seq(Unsupervised.Anon(), Unsupervised.NetE(), Unsupervised.AminerB(), Unsupervised.Ghost())

  def runUnsupervised(spark: SparkSession, c: Corpus, clusterer: Baselines.NameClusterer): (Metrics, Double) = {
    val out = Baselines.run(spark, c.papers, c.auth, clusterer, Some(c.evalNames)).cache()
    val m = Evaluation.pairwiseMicro(spark, out.select("pid", "name", "cluster"), c.auth, Some(c.evalNames))
    val avgNanos = out.select("name", "nanos").distinct()
      .agg(avg(col("nanos"))).collect()(0).getDouble(0)
    out.unpersist()
    (m, avgNanos / 1e9)
  }

  def runSupervised(spark: SparkSession, c: Corpus, algo: String): Metrics = {
    val pairs = Supervised.labeledPairs(spark, c.papers, c.auth, c.evalNames)
    Supervised.crossPredict(pairs, algo)
  }

  /** All nine Table III rows. */
  def tableIII(spark: SparkSession, c: Corpus, iuadCfg: Iuad.Config = Iuad.Config()): Seq[NamedMetrics] = {
    val sup = Seq("adaboost" -> "AdaBoost", "gbdt" -> "GBDT", "rf" -> "RF", "xgboost" -> "XGBoost")
      .map { case (key, label) => NamedMetrics(label, "Supervised", runSupervised(spark, c, key)) }
    val unsup = unsupervisedClusterers.map { cl =>
      NamedMetrics(cl.id, "Unsupervised", runUnsupervised(spark, c, cl)._1)
    }
    val (_, _, gcn) = runIuad(spark, c, iuadCfg)
    sup ++ unsup :+ NamedMetrics("IUAD", "Our", gcn)
  }

  // ---------------------------------------------------------------- Table IV

  final case class StageEffect(scn: Metrics, gcn: Metrics) {
    def improvements: Seq[(String, Double, Double, Double)] = Seq(
      ("MicroA", scn.accuracy, gcn.accuracy, gcn.accuracy - scn.accuracy),
      ("MicroP", scn.precision, gcn.precision, gcn.precision - scn.precision),
      ("MicroR", scn.recall, gcn.recall, gcn.recall - scn.recall),
      ("MicroF", scn.f1, gcn.f1, gcn.f1 - scn.f1),
    )
  }

  def tableIV(spark: SparkSession, c: Corpus, cfg: Iuad.Config = Iuad.Config()): StageEffect = {
    val (_, scn, gcn) = runIuad(spark, c, cfg)
    StageEffect(scn, gcn)
  }

  // ----------------------------------------------------------------- Table V

  final case class TimingRow(algorithm: String, fraction: Double, secondsPerName: Double)

  /** Average disambiguation time per name at increasing data fractions.
    * Baselines: mean per-name wall time over the testing names. IUAD: full
    * two-stage pipeline wall time divided by the number of testing names
    * (IUAD disambiguates the whole corpus in one pass — chargeable time per
    * testing name is the conservative upper bound).
    */
  def tableV(
      spark: SparkSession,
      c: Corpus,
      fractions: Seq[Double] = Seq(0.2, 0.4, 0.6, 0.8, 1.0),
      iuadCfg: Iuad.Config = Iuad.Config(),
  ): Seq[TimingRow] = {
    fractions.flatMap { f =>
      val sub = subsample(c, f)
      val nEval = math.max(1L, sub.evalNames.count())
      val baselineRows = unsupervisedClusterers.map { cl =>
        val (_, secs) = runUnsupervised(spark, sub, cl)
        TimingRow(cl.id, f, secs)
      }
      val t0 = System.nanoTime()
      val r = Iuad.run(spark, sub.papers, sub.auth, iuadCfg)
      r.assignment.count() // force the full pipeline
      val iuadSecs = (System.nanoTime() - t0) / 1e9 / nEval
      baselineRows :+ TimingRow("IUAD", f, iuadSecs)
    }
  }

  /** Fig 5 companion: SCN/GCN quality vs data fraction. */
  def dataScaleQuality(
      spark: SparkSession,
      c: Corpus,
      fractions: Seq[Double] = Seq(0.2, 0.4, 0.6, 0.8, 1.0),
      cfg: Iuad.Config = Iuad.Config(),
  ): Seq[(Double, Metrics, Metrics)] =
    fractions.map { f =>
      val sub = subsample(c, f)
      val (_, scn, gcn) = runIuad(spark, sub, cfg)
      (f, scn, gcn)
    }

  // ---------------------------------------------------------------- Table VI

  final case class IncrementalRow(
      nNew: Long,
      base: Metrics,     // metrics on part 1 only (before incremental)
      combined: Metrics, // metrics on all data after incremental judging
      avgMsPerPaper: Double,
  )

  /** Incremental manner analysis: hold out the `nNew` newest papers touching
    * a testing name, build the GCN on the rest, judge the held-out papers one
    * by one with the learned model.
    */
  def tableVI(
      spark: SparkSession,
      c: Corpus,
      sizes: Seq[Int] = Seq(100, 200, 300),
      cfg: Iuad.Config = Iuad.Config(),
  ): Seq[IncrementalRow] = {
    import spark.implicits._
    val evalPids = c.auth.join(c.evalNames, Seq("name")).select("pid").distinct()
    val newestEval = c.papers.join(evalPids, Seq("pid"))
      .orderBy(desc("year"), desc("pid")).select("pid").as[Long].collect()

    sizes.map { n =>
      val held = newestEval.take(math.min(n, newestEval.length)).toSet
      val papersOld = c.papers.filter(!col("pid").isInCollection(held)).cache()
      val authOld = c.auth.filter(!col("pid").isInCollection(held)).cache()
      val papersNew = c.papers.filter(col("pid").isInCollection(held))
      val authNew = c.auth.filter(col("pid").isInCollection(held))

      val r = Iuad.run(spark, papersOld, authOld, cfg)
      val base = Evaluation.pairwiseMicro(spark, r.assignment, authOld, Some(c.evalNames))

      val clusters = Incremental.clusterProfiles(spark, r.profiles, r.mapping).cache()
      clusters.count()
      val t0 = System.nanoTime()
      val judged = Incremental
        .disambiguate(spark, clusters, papersNew, authNew, r.model, r.stats, cfg.delta, cfg.wlIters)
        .cache()
      val nOcc = judged.count()
      val wallMs = (System.nanoTime() - t0) / 1e6
      val combinedAssign = r.assignment.unionByName(judged.select("pid", "name", "cluster"))
      val combined = Evaluation.pairwiseMicro(spark, combinedAssign, c.auth, Some(c.evalNames))
      papersOld.unpersist(); authOld.unpersist(); clusters.unpersist()
      IncrementalRow(held.size.toLong, base, combined, wallMs / math.max(1L, nOcc))
    }
  }

  // -------------------------------------------------------------- formatting

  def fmtMetrics(label: String, m: Metrics): String =
    f"$label%-10s MicroA=${m.accuracy}%.4f MicroP=${m.precision}%.4f MicroR=${m.recall}%.4f MicroF=${m.f1}%.4f"
}
