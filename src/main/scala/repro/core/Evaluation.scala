package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import Model.Metrics

/** Pairwise micro evaluation (§VI-A.2): over all same-name paper pairs,
  * TP/FP/FN/TN compare "predicted same cluster" against "truly same author".
  * Counts are summed across all names before the ratios (micro averaging).
  */
object Evaluation {

  /** Names with ≥ 2 distinct ground-truth authors — the testing subset
    * (stand-in for the paper's DBLP∩DAminer 50-name set).
    */
  def ambiguousNames(truth: DataFrame): DataFrame =
    truth
      .groupBy("name")
      .agg(countDistinct("authorId").as("nAuthors"))
      .where(col("nAuthors") >= 2)
      .select("name")

  /** Micro counts for a predicted assignment.
    *
    * @param assignment (pid, name, cluster)
    * @param truth      (pid, name, authorId)
    * @param evalNames  optional (name) restriction (testing subset)
    */
  def pairwiseMicro(
      spark: SparkSession,
      assignment: DataFrame,
      truth: DataFrame,
      evalNames: Option[DataFrame] = None,
  ): Metrics = {
    val joined0 = assignment
      .join(truth.select("pid", "name", "authorId"), Seq("pid", "name"))
    val joined = evalNames match {
      case Some(names) => joined0.join(names, Seq("name"))
      case None        => joined0
    }
    val l = joined.as("l"); val r = joined.as("r")
    val pairs = l.join(
      r,
      col("l.name") === col("r.name") && col("l.pid") < col("r.pid"),
    )
    val agg = pairs
      .select(
        (col("l.cluster") === col("r.cluster")).as("predSame"),
        (col("l.authorId") === col("r.authorId")).as("trueSame"),
      )
      .groupBy()
      .agg(
        sum(when(col("predSame") && col("trueSame"), 1L).otherwise(0L)).as("tp"),
        sum(when(col("predSame") && !col("trueSame"), 1L).otherwise(0L)).as("fp"),
        sum(when(!col("predSame") && col("trueSame"), 1L).otherwise(0L)).as("fn"),
        sum(when(!col("predSame") && !col("trueSame"), 1L).otherwise(0L)).as("tn"),
      )
      .collect()(0)
    def n(i: Int): Long = if (agg.isNullAt(i)) 0L else agg.getLong(i)
    Metrics(n(0), n(1), n(2), n(3))
  }
}
