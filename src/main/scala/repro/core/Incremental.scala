package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import Model._

/** Incremental single-paper disambiguation (§V-E).
  *
  * A new paper's author occurrence is an isolated vertex v^a; we compute its
  * similarity vector against every same-name GCN cluster, score with the
  * *already learned* model (no re-training) and attach to the argmax cluster
  * iff its score clears δ — otherwise the occurrence opens a new cluster.
  */
object Incremental {

  /** One GCN cluster folded into a single profile (members merged). */
  def clusterProfiles(
      spark: SparkSession,
      profiles: Dataset[VertexProfile],
      mapping: DataFrame,
  ): Dataset[VertexProfile] = {
    import spark.implicits._
    val vidToCluster = mapping
      .select(col("vid").as("mvid"), col("cluster"))
      .as[(String, String)]
    profiles
      .joinWith(vidToCluster, profiles("vid") === vidToCluster("mvid"))
      .map { case (p, (_, cluster)) => (cluster, p) }
      .groupByKey(_._1)
      .mapGroups { (cid, it) => Profiles.merge(cid, it.map(_._2).toSeq) }
  }

  /** Isolated-vertex profile of one new paper occurrence. */
  def newOccurrenceProfile(
      pid: Long,
      name: String,
      title: Seq[String],
      venue: String,
      year: Int,
      coNames: Seq[String],
      wlIters: Int,
  ): VertexProfile = {
    val vid = s"$name#new$pid"
    val cs = coNames.distinct.sorted
    val cliques =
      (for (i <- cs.indices; j <- (i + 1) until cs.size) yield Profiles.encodeClique(cs(i), cs(j))).toSeq
    VertexProfile(
      vid = vid,
      name = name,
      pids = Seq(pid),
      wordYears = title.map(w => (w, year)),
      venues = Seq(venue),
      years = Seq(year),
      cliques = cliques,
      wl = WlKernel.features(vid, Map.empty, Map.empty, wlIters),
    )
  }

  /** Judge every new (paper, name) occurrence.
    *
    * @return (pid, name, cluster, bestScore, nanosPerOccurrence)
    */
  def disambiguate(
      spark: SparkSession,
      gcnClusters: Dataset[VertexProfile],
      newPapers: DataFrame,
      newAuthorships: DataFrame,
      model: Em.EmModel,
      stats: Similarity.GlobalStats,
      delta: Double,
      wlIters: Int = 2,
  ): DataFrame = {
    import spark.implicits._
    val bModel = spark.sparkContext.broadcast(model)
    val bStats = spark.sparkContext.broadcast(stats)

    val coLists = newAuthorships
      .select("pid", "name")
      .distinct()
      .groupBy("pid")
      .agg(collect_list("name").as("allNames"))
    val newOcc = newAuthorships
      .select("pid", "name")
      .distinct()
      .join(newPapers.select("pid", "title", "venue", "year"), Seq("pid"))
      .join(coLists, Seq("pid"))
      .as[(Long, String, Seq[String], String, Int, Seq[String])]
      .map { case (pid, name, title, venue, year, allNames) =>
        newOccurrenceProfile(pid, name, title, venue, year, allNames.filterNot(_ == name), wlIters)
      }

    newOcc
      .groupByKey(_.name)
      .cogroup(gcnClusters.groupByKey(_.name)) { (name, newIt, clustIt) =>
        val clusters = clustIt.toArray
        newIt.map { np =>
          val t0 = System.nanoTime()
          var bestCluster: String = np.vid
          var bestScore = Double.NegativeInfinity
          var i = 0
          while (i < clusters.length) {
            val s = bModel.value.score(Similarity.gamma(np, clusters(i), bStats.value).toSeq)
            if (s > bestScore || (s == bestScore && clusters(i).vid < bestCluster)) {
              bestScore = s; bestCluster = clusters(i).vid
            }
            i += 1
          }
          val chosen = if (clusters.nonEmpty && bestScore >= delta) bestCluster else np.vid
          val pid = np.pids.head
          (pid, name, chosen, if (clusters.isEmpty) Double.NaN else bestScore, System.nanoTime() - t0)
        }
      }
      .toDF("pid", "name", "cluster", "bestScore", "nanos")
  }
}
