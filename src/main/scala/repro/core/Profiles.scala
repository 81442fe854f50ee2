package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import Model._

/** Builds one [[Model.VertexProfile]] per SCN vertex that owns papers.
  *
  * Relational parts (paper attributes, co-author lists) are DataFrame joins;
  * the per-vertex fold is a `groupByKey(vid).mapGroups`. WL features need the
  * instance-level SCN adjacency, which is SCR-derived and therefore small —
  * it is collected once and broadcast.
  */
object Profiles {

  /** Separator inside encoded clique strings ("yz", y < z). */
  val CliqueSep = '\u0001'

  def encodeClique(y: String, z: String): String =
    if (y < z) s"$y$CliqueSep$z" else s"$z$CliqueSep$y"

  /** All (vid, name, pid, title, venue, year, coNames) rows. */
  private def joined(scn: Scn, papers: DataFrame, authorships: DataFrame): DataFrame = {
    val occ = authorships.select("pid", "name").distinct()
    val coNames = scn.vertexPapers
      .join(occ.withColumnRenamed("name", "coName"), Seq("pid"))
      .where(col("coName") =!= col("name"))
      .groupBy("vid", "pid")
      .agg(collect_list("coName").as("coNames"))
    scn.vertexPapers
      .join(papers, Seq("pid"))
      .join(coNames, Seq("vid", "pid"), "left_outer")
      .select(
        col("vid"), col("name"), col("pid"), col("title"), col("venue"), col("year"),
        coalesce(col("coNames"), array().cast("array<string>")).as("coNames"),
      )
  }

  /** Profiles without WL features (wl left empty). */
  def buildBase(spark: SparkSession, scn: Scn, papers: DataFrame, authorships: DataFrame): Dataset[VertexProfile] = {
    import spark.implicits._
    joined(scn, papers, authorships)
      .as[(String, String, Long, Seq[String], String, Int, Seq[String])]
      .groupByKey(_._1)
      .mapGroups { (vid, it) =>
        val rows = it.toArray
        val name = rows.head._2
        val pids = rows.map(_._3).toSeq.sorted
        val wordYears = rows.flatMap { case (_, _, _, title, _, year, _) =>
          title.map(w => (w, year))
        }.toSeq
        val venues = rows.map(_._5).toSeq.sorted
        val years = rows.map(_._6).toSeq.sorted
        val cliques = rows.flatMap { case (_, _, _, _, _, _, coNames) =>
          val cs = coNames.distinct.sorted
          for (i <- cs.indices; j <- (i + 1) until cs.size) yield encodeClique(cs(i), cs(j))
        }.distinct.toSeq.sorted
        VertexProfile(vid, name, pids, wordYears, venues, years, cliques, Map.empty)
      }
  }

  /** Attach WL features using the broadcast SCN adjacency. */
  def withWl(
      spark: SparkSession,
      base: Dataset[VertexProfile],
      scn: Scn,
      wlIters: Int,
  ): Dataset[VertexProfile] = {
    import spark.implicits._
    val edgeRows = scn.edges.select("src", "dst").as[(String, String)].collect()
    val adj: Map[String, Array[String]] = {
      val m = scala.collection.mutable.HashMap.empty[String, scala.collection.mutable.ArrayBuffer[String]]
      edgeRows.foreach { case (s, d) =>
        m.getOrElseUpdate(s, scala.collection.mutable.ArrayBuffer.empty) += d
        m.getOrElseUpdate(d, scala.collection.mutable.ArrayBuffer.empty) += s
      }
      m.map { case (k, v) => k -> v.distinct.sorted.toArray }.toMap
    }
    val bAdj = spark.sparkContext.broadcast(adj)
    base.map { p =>
      p.copy(wl = WlKernel.features(p.vid, bAdj.value, Map.empty, wlIters))
    }
  }

  /** Full profile build: relational fold + WL attachment. */
  def build(
      spark: SparkSession,
      scn: Scn,
      papers: DataFrame,
      authorships: DataFrame,
      wlIters: Int = 2,
  ): Dataset[VertexProfile] =
    withWl(spark, buildBase(spark, scn, papers, authorships), scn, wlIters)

  /** Merge several profiles into one (used when GCN clusters vertices and in
    * the incremental judge). WL maps are summed — an approximation of the
    * merged vertex's ego features, adequate because γ1 is normalised.
    */
  def merge(vid: String, ps: Seq[VertexProfile]): VertexProfile = {
    require(ps.nonEmpty, "merge of zero profiles")
    val wl = ps.foldLeft(Map.empty[String, Int]) { (acc, p) =>
      p.wl.foldLeft(acc) { case (a, (k, c)) => a.updated(k, a.getOrElse(k, 0) + c) }
    }
    VertexProfile(
      vid = vid,
      name = ps.head.name,
      pids = ps.flatMap(_.pids).distinct.sorted,
      wordYears = ps.flatMap(_.wordYears),
      venues = ps.flatMap(_.venues).sorted,
      years = ps.flatMap(_.years).sorted,
      cliques = ps.flatMap(_.cliques).distinct.sorted,
      wl = wl,
    )
  }
}
