package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.dblp.DblpSynth

class ScrSpec extends SparkSpec {
  import spark.implicits._

  private def auth(rows: (Long, String)*) =
    rows.toDF("pid", "name")

  test("pair counts on a tiny hand-built corpus") {
    val a = auth((1L, "a"), (1L, "b"), (2L, "a"), (2L, "b"), (3L, "a"), (3L, "c"))
    val got = Scr.pairCounts(a).as[(String, String, Long)].collect().toSet
    assert(got === Set(("a", "b", 2L), ("a", "c", 1L)))
  }

  test("mine filters by support threshold") {
    val a = auth((1L, "a"), (1L, "b"), (2L, "a"), (2L, "b"), (3L, "a"), (3L, "c"))
    val got = Scr.mine(a, 2).as[(String, String, Long)].collect().toSet
    assert(got === Set(("a", "b", 2L)))
  }

  test("mine rejects non-positive eta") {
    val a = auth((1L, "a"), (1L, "b"))
    intercept[IllegalArgumentException] { Scr.mine(a, 0) }
  }

  test("pairs are canonical (a < b) and symmetric input collapses") {
    val a = auth((1L, "z"), (1L, "a"), (2L, "a"), (2L, "z"))
    val got = Scr.pairCounts(a).as[(String, String, Long)].collect().toSet
    assert(got === Set(("a", "z", 2L)))
  }

  test("duplicate (pid, name) occurrences count once per paper") {
    val a = auth((1L, "a"), (1L, "a"), (1L, "b"))
    val got = Scr.pairCounts(a).as[(String, String, Long)].collect().toSet
    assert(got === Set(("a", "b", 1L)))
  }

  test("triangles found when all three pairs are SCRs") {
    val scrs = Seq(("a", "b", 3L), ("a", "c", 3L), ("b", "c", 3L), ("a", "d", 3L))
      .toDF("a", "b", "cnt")
    val got = Scr.triangles(scrs).as[(String, String, String)].collect().toSet
    assert(got === Set(("a", "b", "c")))
  }

  test("no triangle when one side is missing") {
    val scrs = Seq(("a", "b", 3L), ("a", "c", 3L)).toDF("a", "b", "cnt")
    assert(Scr.triangles(scrs).count() === 0L)
  }

  test("oracle: pair counts match DuckDB self-join") {
    val (_, a) = DblpSynth.generate(spark, DblpSynth.Config(sf = 0.002, seed = 7L))
    val occ = a.select("pid", "name").distinct()
    Oracle.assertEquivalent(
      Scr.pairCounts(a).withColumn("cnt", col("cnt").cast("string")),
      """SELECT l.name AS a, r.name AS b, CAST(count(*) AS VARCHAR) AS cnt
        |FROM occ l JOIN occ r ON l.pid = r.pid AND l.name < r.name
        |GROUP BY l.name, r.name""".stripMargin,
      "occ" -> occ,
    )
  }

  test("DataFrame mining is equivalent to FP-growth 2-itemsets") {
    val (_, a) = DblpSynth.generate(spark, DblpSynth.Config(sf = 0.002, seed = 9L))
    val eta = 3
    val viaDf = Scr.mine(a, eta).as[(String, String, Long)].collect().toSet
    val viaFp = Scr.mineViaFpGrowth(spark, a, eta).as[(String, String, Long)].collect().toSet
    assert(viaDf === viaFp)
  }

  test("synthetic corpus yields a non-trivial number of SCRs at eta=3") {
    val (_, a) = DblpSynth.generate(spark, DblpSynth.Config(sf = 0.003, seed = 42L))
    val n = Scr.mine(a, 3).count()
    assert(n > 20L, s"only $n SCRs — generator not collaborative enough")
  }

  test("higher eta is monotonically more selective") {
    val (_, a) = DblpSynth.generate(spark, DblpSynth.Config(sf = 0.002, seed = 5L))
    val n2 = Scr.mine(a, 2).count()
    val n3 = Scr.mine(a, 3).count()
    val n5 = Scr.mine(a, 5).count()
    assert(n2 >= n3 && n3 >= n5)
  }
}
