package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import Model._

/** End-to-end IUAD pipeline (Algorithm 1).
  *
  * Stage I: [[ScnBuilder]] mines η-SCRs + triangles and builds the SCN.
  * Stage II: [[Profiles]] + [[Similarity]] produce candidate-pair similarity
  * vectors; [[Em]] learns the generative model on a 10 % sample augmented
  * with split-vertex matched pairs (§V-F.2); [[GcnBuilder]] scores all pairs
  * distributed and merges those with log-odds ≥ δ.
  */
object Iuad {

  /** δ = 25 was calibrated once on the synthetic corpus (δ-sweep in
    * DebugGcn): log-odds below ~20 admit singleton pairs whose only evidence
    * is one shared venue; the paper likewise tunes its pre-defined δ.
    */
  final case class Config(
      eta: Int = 3,
      wlIters: Int = 2,
      delta: Double = 25.0,
      sampleFrac: Double = 0.1,
      minTrainPairs: Int = 200,
      splitMinPapers: Int = 6,
      splitMaxVertices: Int = 300,
      seed: Long = 7L,
      em: Em.Config = Em.Config(),
  )

  final case class Result(
      scn: Scn,
      profiles: Dataset[VertexProfile],
      stats: Similarity.GlobalStats,
      pairs: Dataset[PairGamma],
      model: Em.EmModel,
      scored: Dataset[ScoredPair],
      mapping: DataFrame,        // (vid, name, cluster)
      assignment: DataFrame,     // GCN:  (pid, name, cluster)
      scnAssignment: DataFrame,  // SCN-only: (pid, name, cluster=vid)
  )

  /** Matched training pairs from randomly splitting prolific SCN vertices in
    * two (balances the heavy unmatched majority, §V-F.2). Pseudo-profiles are
    * built through the same [[Profiles]] fold as real ones.
    */
  def splitVertexPairs(
      spark: SparkSession,
      scn: Scn,
      papers: DataFrame,
      authorships: DataFrame,
      stats: Similarity.GlobalStats,
      cfg: Config,
  ): Array[Array[Double]] = {
    import spark.implicits._
    val eligible = scn.vertexPapers
      .groupBy("vid")
      .agg(countDistinct("pid").as("n"))
      .where(col("n") >= cfg.splitMinPapers)
      .orderBy(abs(hash(col("vid"), lit(cfg.seed))), col("vid"))
      .limit(cfg.splitMaxVertices)
      .select("vid")
    val chosen = eligible.as[String].collect().toSet
    if (chosen.isEmpty) return Array.empty
    val bChosen = spark.sparkContext.broadcast(chosen)

    val pseudoVp = scn.vertexPapers
      .filter(col("vid").isInCollection(chosen))
      .withColumn(
        "vid",
        concat(col("vid"), when(pmod(col("pid") + lit(cfg.seed), lit(2)) === 0, lit("/s0")).otherwise(lit("/s1"))),
      )
    val pseudoScn = Scn(scn.vertices, scn.edges, pseudoVp, scn.neighborComp)
    val pseudo = Profiles
      .buildBase(spark, pseudoScn, papers, authorships)
      .map(p => p.copy(wl = WlKernel.features(p.vid, Map.empty, Map.empty, cfg.wlIters)))
      .collect()

    pseudo
      .groupBy(_.vid.split("/s").head)
      .valuesIterator
      .collect { case Array(a, b) => Similarity.gamma(a, b, stats) }
      .toArray
  }

  def run(spark: SparkSession, papers: DataFrame, authorships: DataFrame, cfg: Config = Config()): Result = {
    import spark.implicits._

    // Stage I — SCN.
    val scn = ScnBuilder.build(spark, authorships, cfg.eta)
    val scnAssignment = scn.vertexPapers.select(col("pid"), col("name"), col("vid").as("cluster"))

    // Stage II — profiles, similarities.
    val stats = Similarity.globalStats(spark, papers)
    val profiles = Profiles.build(spark, scn, papers, authorships, cfg.wlIters).cache()
    val pairs = Similarity.candidatePairs(spark, profiles, stats).cache()

    // Training sample (10 %) + split-vertex matched pairs.
    val nPairs = pairs.count()
    val frac =
      if (nPairs == 0L) 0.0
      else math.min(1.0, math.max(cfg.sampleFrac, cfg.minTrainPairs.toDouble / nPairs))
    val sample = pairs.sample(withReplacement = false, frac, cfg.seed).map(_.g.toArray).collect()
    val known = splitVertexPairs(spark, scn, papers, authorships, stats, cfg)

    val model = Em.fit(sample, cfg.em, known)

    // Score all pairs distributed; merge accepted ones.
    val scored = GcnBuilder.scorePairs(spark, pairs, model)
    val mapping = GcnBuilder.clusterMapping(spark, scn.vertices, scored, cfg.delta)
    val assignment = GcnBuilder.assignment(scn.vertexPapers, mapping)

    Result(scn, profiles, stats, pairs, model, scored, mapping, assignment, scnAssignment)
  }
}
