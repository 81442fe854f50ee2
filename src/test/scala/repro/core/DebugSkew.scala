package repro.core

import repro.dblp.DblpSynth

/** Generator skew check at bench scale — bounds the per-name candidate-pair
  * blow-up (no Spark needed).
  */
object DebugSkew {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val cfg = DblpSynth.Config(sf = sf, seed = 42L)
    println(s"papers=${cfg.nPapers} authors=${cfg.nAuthors} teams=${cfg.nTeams} comms=${cfg.nComms} ambNames=${cfg.nAmbNames}")
    val authCounts = new java.util.HashMap[Long, Int]()
    var pid = 0L
    while (pid < cfg.nPapers) {
      DblpSynth.paperAuthors(pid, cfg).foreach(a => authCounts.merge(a, 1, Integer.sum _))
      pid += 1
    }
    import scala.jdk.CollectionConverters._
    val counts = authCounts.values().asScala.map(_.toInt).toArray.sorted.reverse
    println(s"top author occurrences: ${counts.take(12).mkString(",")}")
    println(s"authors>500: ${counts.count(_ > 500)}  >200: ${counts.count(_ > 200)}  >100: ${counts.count(_ > 100)}")
    // name-level: aggregate namesakes
    val names = DblpSynth.buildNames(cfg)
    val nameCounts = new java.util.HashMap[String, Int]()
    authCounts.asScala.foreach { case (a, c) => nameCounts.merge(names(a.toInt), c, Integer.sum _) }
    val nc = nameCounts.values().asScala.map(_.toInt).toArray.sorted.reverse
    println(s"top name occurrences: ${nc.take(12).mkString(",")}")
    // worst-case singleton-pair estimate: occurrences ~ upper bound on vertices
    val worstPairs = nc.take(5).map(n => n.toLong * n / 2).sum
    println(s"worst-5 names pair bound: $worstPairs")
  }
}
