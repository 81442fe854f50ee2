package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** Shared session bootstrap for the spark-submit entrypoints.
  *
  * Usage: spark-submit --class repro.jobs.TableIII repro.jar [sf] [seed]
  * Default sf = 0.1 (benchmark scale), seed = 42.
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def parse(args: Array[String]): (Double, Long) = (
    args.headOption.map(_.toDouble).getOrElse(0.1),
    args.lift(1).map(_.toLong).getOrElse(42L),
  )
}

/** Table II: descriptive statistics of the testing dataset. */
object TableII {
  def main(args: Array[String]): Unit = {
    val (sf, seed) = Jobs.parse(args)
    val spark = Jobs.session("repro-tableII")
    val c = Experiments.corpus(spark, sf, seed)
    val t = Experiments.tableII(spark, c)
    println(s"== Table II (sf=$sf seed=$seed) ==")
    println(f"${"Name"}%-16s ${"#Authors_TD"}%12s ${"#Papers_TD"}%11s")
    t.collect().foreach { r =>
      println(f"${r.getString(0)}%-16s ${r.getLong(1)}%12d ${r.getLong(2)}%11d")
    }
    val tot = t.groupBy().sum("authors_td", "papers_td").collect()(0)
    println(f"${"Total"}%-16s ${tot.getLong(0)}%12d ${tot.getLong(1)}%11d over ${t.count()} names")
    spark.stop()
  }
}

/** Table III: IUAD vs supervised and unsupervised baselines. */
object TableIII {
  def main(args: Array[String]): Unit = {
    val (sf, seed) = Jobs.parse(args)
    val spark = Jobs.session("repro-tableIII")
    val c = Experiments.corpus(spark, sf, seed)
    println(s"== Table III (sf=$sf seed=$seed) ==")
    Experiments.tableIII(spark, c).foreach { nm =>
      println(f"${nm.group}%-12s ${Experiments.fmtMetrics(nm.algorithm, nm.m)}")
    }
    spark.stop()
  }
}

/** Table IV: effect of the two stages. */
object TableIV {
  def main(args: Array[String]): Unit = {
    val (sf, seed) = Jobs.parse(args)
    val spark = Jobs.session("repro-tableIV")
    val c = Experiments.corpus(spark, sf, seed)
    val e = Experiments.tableIV(spark, c)
    println(s"== Table IV (sf=$sf seed=$seed) ==")
    println(f"${"Metric"}%-8s ${"SCN"}%8s ${"GCN"}%8s ${"Improv."}%9s")
    e.improvements.foreach { case (name, scn, gcn, d) =>
      println(f"$name%-8s $scn%8.4f $gcn%8.4f ${if (d >= 0) "+" else ""}$d%.4f")
    }
    spark.stop()
  }
}

/** Table V: average time per name at 20..100 % data. */
object TableV {
  def main(args: Array[String]): Unit = {
    val (sf, seed) = Jobs.parse(args)
    val spark = Jobs.session("repro-tableV")
    val c = Experiments.corpus(spark, sf, seed)
    println(s"== Table V (sf=$sf seed=$seed) — seconds per name ==")
    val rows = Experiments.tableV(spark, c)
    rows.groupBy(_.algorithm).toSeq.sortBy(_._1).foreach { case (algo, rs) =>
      val cells = rs.sortBy(_.fraction).map(r => f"${r.secondsPerName}%9.4f").mkString(" ")
      println(f"$algo%-8s $cells")
    }
    spark.stop()
  }
}

/** Table VI: incremental author disambiguation performance and efficiency. */
object TableVI {
  def main(args: Array[String]): Unit = {
    val (sf, seed) = Jobs.parse(args)
    val spark = Jobs.session("repro-tableVI")
    val c = Experiments.corpus(spark, sf, seed)
    println(s"== Table VI (sf=$sf seed=$seed) ==")
    Experiments.tableVI(spark, c).foreach { row =>
      println(s"-- ${row.nNew} new papers --")
      println(Experiments.fmtMetrics("base", row.base))
      println(Experiments.fmtMetrics("combined", row.combined))
      println(f"avg time per paper: ${row.avgMsPerPaper}%.2f ms")
    }
    spark.stop()
  }
}
