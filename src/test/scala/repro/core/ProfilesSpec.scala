package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.dblp.DblpSynth

class ProfilesSpec extends SparkSpec {
  import spark.implicits._

  private lazy val cfg = DblpSynth.Config(sf = 0.002, seed = 21L)
  private lazy val (papersDf, authDf) = {
    val (p, a) = DblpSynth.generate(spark, cfg)
    (p.cache(), a.cache())
  }
  private lazy val scn = ScnBuilder.build(spark, authDf, 3)
  private lazy val profiles = Profiles.build(spark, scn, papersDf, authDf, wlIters = 2).cache()

  test("one profile per vertex with papers") {
    val nVertsWithPapers = scn.vertexPapers.select("vid").distinct().count()
    assert(profiles.count() === nVertsWithPapers)
  }

  test("profile paper counts match vertexPapers") {
    val expected = scn.vertexPapers.groupBy("vid").agg(countDistinct("pid").as("n"))
      .as[(String, Long)].collect().toMap
    profiles.collect().foreach { p =>
      assert(p.pids.size.toLong === expected(p.vid), s"vid ${p.vid}")
    }
  }

  test("profiles carry venues and years per paper") {
    profiles.take(50).foreach { p =>
      assert(p.venues.size === p.pids.size)
      assert(p.years.size === p.pids.size)
    }
  }

  test("wordYears hold every title word of the vertex's papers") {
    val prof = profiles.collect().maxBy(_.nPapers)
    val expected = scn.vertexPapers
      .filter(col("vid") === prof.vid)
      .join(papersDf, Seq("pid"))
      .select(explode(col("title")))
      .count()
    assert(prof.wordYears.size.toLong === expected)
  }

  test("cliques come from co-author pairs of the vertex's papers") {
    // A vertex whose papers have >= 2 co-authors must have >= 1 clique.
    val withBigPapers = scn.vertexPapers
      .join(authDf.groupBy("pid").agg(count(lit(1)).as("na")), Seq("pid"))
      .filter(col("na") >= 3)
      .select("vid").distinct().as[String].collect().toSet
    val some = profiles.filter(p => withBigPapers.contains(p.vid)).take(20)
    assert(some.nonEmpty)
    some.foreach(p => assert(p.cliques.nonEmpty, s"${p.vid} has 3+-author papers but no cliques"))
  }

  test("clique encoding is canonical") {
    assert(Profiles.encodeClique("b", "a") === Profiles.encodeClique("a", "b"))
    assert(Profiles.encodeClique("a", "b").contains(Profiles.CliqueSep))
  }

  test("SCR vertices have non-empty WL features with neighbour labels") {
    val scrProf = profiles.filter(_.vid.contains("#c")).take(5)
    assert(scrProf.nonEmpty)
    scrProf.foreach { p =>
      assert(p.wl.nonEmpty)
      assert(p.wl.keys.exists(_.startsWith("0|")))
    }
  }

  test("singleton vertices have isolated WL features") {
    val single = profiles.filter(_.vid.contains("#p")).take(5)
    assert(single.nonEmpty)
    single.foreach { p =>
      // iterations 0..2, one vertex → exactly 3 label occurrences
      assert(p.wl.values.sum === 3, s"${p.vid}: ${p.wl}")
    }
  }

  test("merge concatenates papers and sums WL counts") {
    val ps = profiles.take(2)
    val m = Profiles.merge("merged", ps.toSeq)
    assert(m.pids.toSet === ps.flatMap(_.pids).toSet)
    assert(m.venues.size === ps.map(_.venues.size).sum)
    val totalWl = ps.map(_.wl.values.sum).sum
    assert(m.wl.values.sum === totalWl)
  }

  test("merge rejects empty input") {
    intercept[IllegalArgumentException] { Profiles.merge("x", Seq.empty) }
  }

  test("profile names match their vid prefix") {
    profiles.take(100).foreach { p =>
      assert(p.vid.startsWith(p.name + "#"), s"${p.vid} vs ${p.name}")
    }
  }
}
