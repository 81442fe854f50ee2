package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.util.UnionFind
import Model._

/** Stage II of IUAD: score candidate pairs with the learned generative model
  * and merge accepted pairs into global-collaboration-network clusters.
  *
  * Scoring is distributed (broadcast model, posterior per partition); merging
  * is a driver-side union-find on the *accepted* pairs only, which are few.
  */
object GcnBuilder {

  /** Score every candidate pair with sc_j = log(P(M|γ)/P(U|γ)) (Eq. 11). */
  def scorePairs(spark: SparkSession, pairs: Dataset[PairGamma], model: Em.EmModel): Dataset[ScoredPair] = {
    import spark.implicits._
    val bModel = spark.sparkContext.broadcast(model)
    pairs.mapPartitions { it =>
      val m = bModel.value
      it.map(p => ScoredPair(p.name, p.vi, p.vj, m.score(p.g)))
    }
  }

  /** Cluster mapping: vid → gcnId (canonical min member vid) from accepted
    * pairs (score ≥ δ). Vertices in no accepted pair map to themselves.
    */
  def clusterMapping(
      spark: SparkSession,
      vertices: DataFrame,
      scored: Dataset[ScoredPair],
      delta: Double,
  ): DataFrame = {
    import spark.implicits._
    val accepted = scored.filter(_.score >= delta).map(sp => (sp.vi, sp.vj)).collect()
    val uf = new UnionFind[String]
    accepted.foreach { case (a, b) => uf.union(a, b) }
    // Canonical cluster id = min vid in the component.
    val groups = uf.groups().map(_.sorted)
    val mapping: Map[String, String] =
      groups.flatMap(g => g.map(v => v -> g.head)).toMap
    val bMap = spark.sparkContext.broadcast(mapping)
    val toCluster = udf((vid: String) => bMap.value.getOrElse(vid, vid))
    vertices.select(
      col("vid"),
      col("name"),
      toCluster(col("vid")).as("cluster"),
    )
  }

  /** Paper-occurrence level assignment: (pid, name, cluster). */
  def assignment(vertexPapers: DataFrame, mapping: DataFrame): DataFrame =
    vertexPapers
      .join(mapping.select("vid", "cluster"), Seq("vid"))
      .select("pid", "name", "cluster")
}
