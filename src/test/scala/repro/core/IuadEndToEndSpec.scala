package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.dblp.DblpSynth

/** End-to-end pipeline checks at unit-test scale. The quantitative targets
  * mirror Table IV's *shape*: SCN = high precision / modest recall, GCN =
  * large recall gain at a small precision cost.
  */
class IuadEndToEndSpec extends SparkSpec {
  import spark.implicits._

  private lazy val cfg = DblpSynth.Config(sf = 0.005, seed = 42L)
  private lazy val (papersDf, authDf) = {
    val (p, a) = DblpSynth.generate(spark, cfg)
    (p.cache(), a.cache())
  }
  private lazy val evalNames = Evaluation.ambiguousNames(authDf).cache()
  private lazy val result = Iuad.run(spark, papersDf, authDf, Iuad.Config(eta = 3, seed = 7L))
  private lazy val scnMetrics =
    Evaluation.pairwiseMicro(spark, result.scnAssignment, authDf, Some(evalNames))
  private lazy val gcnMetrics =
    Evaluation.pairwiseMicro(spark, result.assignment, authDf, Some(evalNames))

  test("pipeline runs end to end and assigns every occurrence") {
    assert(result.assignment.count() === authDf.select("pid", "name").distinct().count())
  }

  test("every occurrence has exactly one cluster") {
    val dup = result.assignment.groupBy("pid", "name").count().filter(col("count") > 1).count()
    assert(dup === 0L)
  }

  test("clusters never span names") {
    val cross = result.assignment.groupBy("cluster")
      .agg(countDistinct("name").as("n")).filter(col("n") > 1).count()
    assert(cross === 0L)
  }

  test("SCN stage is high precision (Table IV shape)") {
    info(s"SCN: $scnMetrics")
    assert(scnMetrics.precision > 0.85, s"SCN precision: $scnMetrics")
  }

  test("SCN stage has modest recall (bottom-up starts conservative)") {
    assert(scnMetrics.recall < 0.75, s"SCN recall should be the weak spot: $scnMetrics")
  }

  test("GCN improves recall substantially over SCN (Table IV shape)") {
    info(s"GCN: $gcnMetrics")
    assert(gcnMetrics.recall > scnMetrics.recall + 0.10,
      s"GCN must win recall back: SCN=$scnMetrics GCN=$gcnMetrics")
  }

  test("GCN precision stays close to SCN precision (Table IV shape)") {
    assert(gcnMetrics.precision > scnMetrics.precision - 0.12,
      s"GCN gave up too much precision: SCN=$scnMetrics GCN=$gcnMetrics")
  }

  test("GCN F1 beats SCN F1") {
    assert(gcnMetrics.f1 > scnMetrics.f1, s"SCN=$scnMetrics GCN=$gcnMetrics")
  }

  test("overall quality is strong on the synthetic testing subset") {
    assert(gcnMetrics.f1 > 0.6, s"GCN F1 too low: $gcnMetrics")
    assert(gcnMetrics.accuracy > 0.6, s"GCN accuracy too low: $gcnMetrics")
  }

  test("learned model separates matched from unmatched pairs") {
    val m = result.model
    assert(m.p > 0.0 && m.p < 1.0)
    // score must vary across candidate pairs
    val scores = result.scored.map(_.score).take(1000)
    assert(scores.distinct.length > 10)
  }

  test("split-vertex balancing produces matched training pairs") {
    val known = Iuad.splitVertexPairs(spark, result.scn, papersDf, authDf, result.stats,
      Iuad.Config(eta = 3, seed = 7L))
    assert(known.nonEmpty, "no split-vertex pairs at this scale")
    known.foreach(g => assert(g.length === Similarity.NumFeatures))
  }

  test("pipeline is deterministic in config and seed") {
    val r2 = Iuad.run(spark, papersDf, authDf, Iuad.Config(eta = 3, seed = 7L))
    val a1 = result.assignment.orderBy("pid", "name").collect().map(_.toString)
    val a2 = r2.assignment.orderBy("pid", "name").collect().map(_.toString)
    assert(a1.sameElements(a2))
  }

  test("larger delta merges less (recall monotone in -delta)") {
    val strictMapping = GcnBuilder.clusterMapping(spark, result.scn.vertices, result.scored, delta = 1e9)
    val strictAssign = GcnBuilder.assignment(result.scn.vertexPapers, strictMapping)
    val strict = Evaluation.pairwiseMicro(spark, strictAssign, authDf, Some(evalNames))
    assert(strict.recall <= gcnMetrics.recall + 1e-12)
  }
}
