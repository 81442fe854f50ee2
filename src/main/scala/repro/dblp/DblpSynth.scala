package repro.dblp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.util.Rng

/** Synthetic DBLP-like bibliography with ground-truth author identities.
  *
  * Substitutes the paper's real DBLP dump (641 377 papers, 72 522 names),
  * which is unavailable offline. The generator preserves the structural
  * properties IUAD exploits:
  *
  *   - authors are organised into *teams* inside research *communities*;
  *     papers pick a team by a zipf draw, so name-pair co-occurrence
  *     frequencies are heavy-tailed (the paper's Fig. 3(b) observation that
  *     makes η-SCR mining sound);
  *   - a configurable set of *ambiguous names* is shared by 2..17 distinct
  *     authors placed in different teams/communities (Table II shape);
  *   - titles mix community-topic keywords, rare team "signature" keywords
  *     and global stop-topic words (drives γ3/γ4);
  *   - venues mix a per-team representative venue, other community venues and
  *     high-frequency global venues (drives γ5/γ6);
  *   - each team is active in a bounded year window (drives γ4).
  *
  * Everything is a pure function of (seed, ids) via [[Rng]], so the output is
  * identical regardless of partitioning, and the DuckDB oracle sees the same
  * rows as Spark.
  */
object DblpSynth {

  /** One paper record: co-author list lives in [[Authorship]] rows. */
  final case class Paper(pid: Long, title: Seq[String], venue: String, year: Int)

  /** (paper, author) occurrence; `authorId` is ground truth used ONLY by the
    * evaluation — IUAD itself never reads it.
    */
  final case class Authorship(pid: Long, authorId: Long, name: String)

  /** Generator knobs. `sf` scales paper count like the provided TPC-H-lite
    * generators: papers ≈ 641 377 × sf (min 400).
    */
  final case class Config(
      sf: Double = 0.01,
      seed: Long = 42L,
      teamSize: Int = 6,
      authorsPerPaper: Double = 3.0,
      ambNameShare: Int = 40, // one ambiguous name per this many authors
      crossTeamProb: Double = 0.15,
      loneProb: Double = 0.32, // one-off collaborations outside the stable team
      venuesPerComm: Int = 8,  // per-community venue pool (teams pick one rep)
      teamZipfAlpha: Double = 0.5, // team-popularity skew; 0.5 keeps the
      // pair-frequency tail heavy while capping the top name at a few
      // hundred papers, matching Fig 3(a)'s "< 500 papers per name"
      baseYear: Int = 1995,
      yearSpan: Int = 18,
  ) {
    val nPapers: Long = math.max(400L, (641377L * sf).toLong)
    val nAuthors: Int = math.max(80, (nPapers / authorsPerPaper).toInt)
    val nTeams: Int   = math.max(4, nAuthors / teamSize)
    val nComms: Int   = math.max(4, nTeams / 24)
    val nAmbNames: Int = math.max(6, nAuthors / ambNameShare)
  }

  /** Team that leads paper `pid` — the single source of truth shared by
    * author, title, venue and year derivations.
    */
  def paperTeam(pid: Long, cfg: Config): Int =
    Rng.zipf(cfg.nTeams, cfg.teamZipfAlpha, cfg.seed, pid, 1L)

  /** Community of a team (teams are contiguous blocks of author ids). */
  def communityOf(team: Int, cfg: Config): Int =
    team % cfg.nComms // interleaved so ambiguous stride lands in many comms

  def teamOf(authorId: Long, cfg: Config): Int =
    math.min((authorId / cfg.teamSize).toInt, cfg.nTeams - 1)

  /** First publication year of a team's activity window. */
  def teamStartYear(team: Int, cfg: Config): Int =
    cfg.baseYear + (Rng.mix(cfg.seed, team, 401L) >>> 33).toInt % cfg.yearSpan

  /** Length (years) of a team's activity window: 5..15. */
  def teamYearSpan(team: Int, cfg: Config): Int =
    5 + (Rng.mix(cfg.seed, team, 402L) >>> 33).toInt % 11

  /** Driver-side name table: index = authorId. Ambiguous names are assigned
    * first with a large stride so namesakes land in different teams; everyone
    * else gets a globally unique name.
    */
  def buildNames(cfg: Config): Array[String] = {
    val names = new Array[String](cfg.nAuthors)
    var j = 0
    while (j < cfg.nAmbNames) {
      val mult = 2 + Rng.zipf(16, 1.0, cfg.seed, j, 101L)
      val usedTeams = scala.collection.mutable.HashSet.empty[Int]
      var i = 0
      while (i < mult) {
        // Large-prime stride spreads namesakes across teams; linear probe on
        // collision keeps the assignment total.
        // Hash-based placement: a linear stride would align the i-th
        // namesakes of *different* ambiguous names into the same teams,
        // creating artificial high-frequency SCRs between ambiguous names
        // that weld many authors into one SCN vertex (not a real-DBLP
        // phenomenon). Hashing decorrelates the placements.
        var a = ((Rng.mix(cfg.seed, 0x9A3EL, j.toLong, i.toLong) >>> 1) % cfg.nAuthors).toInt
        // Probe in teamSize strides so a collision never pushes two namesakes
        // into the same team (same-team namesakes would share SCR partners
        // and silently poison the ground truth).
        var probes = 0
        while ((names(a) != null || usedTeams.contains(teamOf(a.toLong, cfg))) && probes < cfg.nAuthors) {
          a = (a + cfg.teamSize) % cfg.nAuthors; probes += 1
        }
        if (names(a) != null) { while (names(a) != null) a = (a + 1) % cfg.nAuthors }
        if (names(a) == null) { names(a) = s"Amb_$j"; usedTeams += teamOf(a.toLong, cfg) }
        i += 1
      }
      j += 1
    }
    var a = 0
    while (a < cfg.nAuthors) { if (names(a) == null) names(a) = s"Auth_$a"; a += 1 }
    names
  }

  /** Distinct member author-ids of one paper — pure in (cfg.seed, pid).
    *
    * With probability `loneProb` the paper is a one-off collaboration: the
    * team lead plus 1–3 random authors from the same community but other
    * teams. These pairs are infrequent (no SCR), so the lead's occurrence
    * becomes an SCN singleton — the source of the SCN stage's low recall that
    * GCN construction must win back (Table IV's shape).
    */
  def paperAuthors(pid: Long, cfg: Config): Seq[Long] = {
    val team = paperTeam(pid, cfg)
    if (Rng.uniform(cfg.seed, pid, 60L) < cfg.loneProb) {
      val lead = math.min(
        team.toLong * cfg.teamSize + Rng.zipf(cfg.teamSize, 1.2, cfg.seed, pid, 61L),
        cfg.nAuthors - 1L)
      // 35 % of one-off papers are single-author (tech reports, surveys...);
      // the rest take exactly one guest from *another* community — a one-off
      // cross-area collaboration, not a same-area namesake look-alike.
      if (Rng.uniform(cfg.seed, pid, 65L) < 0.35) return Seq(lead)
      val comm = communityOf(team, cfg)
      val buf = scala.collection.mutable.LinkedHashSet(lead)
      var i = 0
      while (i < 3 && buf.size < 2) {
        val id = (Rng.mix(cfg.seed, pid, 63L + i) >>> 1) % cfg.nAuthors
        val t2 = teamOf(id, cfg)
        if (t2 != team && communityOf(t2, cfg) != comm) buf += id
        i += 1
      }
      return buf.toSeq
    }
    val u = Rng.uniform(cfg.seed, pid, 2L)
    val size =
      if (u < 0.08) 1 else if (u < 0.33) 2 else if (u < 0.63) 3
      else if (u < 0.83) 4 else if (u < 0.95) 5 else 6
    val buf = scala.collection.mutable.LinkedHashSet.empty[Long]
    val first = Rng.zipf(cfg.teamSize, 1.2, cfg.seed, pid, 3L)
    var i = 0
    while (buf.size < math.min(size, cfg.teamSize) && i < cfg.teamSize) {
      val off = (first + i) % cfg.teamSize
      val id = team.toLong * cfg.teamSize + off
      if (id < cfg.nAuthors) buf += id
      i += 1
    }
    // Occasionally swap the last member for someone from an adjacent team in
    // the same community (cross-team edges keep the SCN connected).
    if (buf.size > 1 && Rng.uniform(cfg.seed, pid, 4L) < cfg.crossTeamProb) {
      val other = math.min(cfg.nTeams - 1, math.max(0, team + (if (team % 2 == 0) cfg.nComms else -cfg.nComms)))
      val id = other.toLong * cfg.teamSize + Rng.uniformInt(cfg.teamSize, cfg.seed, pid, 5L)
      if (id < cfg.nAuthors && !buf.contains(id)) { buf -= buf.last; buf += id }
    }
    if (buf.isEmpty) buf += (team.toLong * cfg.teamSize).min(cfg.nAuthors - 1L)
    buf.toSeq
  }

  /** Title keywords of one paper: community-topic words (broad area) +
    * per-team subtopic words (the fine-grained research fingerprint that
    * separates same-community namesakes, as real authors have) + optional
    * rare team signature word + global stop-topic words.
    */
  def paperTitle(pid: Long, team: Int, cfg: Config): Seq[String] = {
    val comm = communityOf(team, cfg)
    val nTopic = 2 + Rng.uniformInt(2, cfg.seed, pid, 6L)
    val topic = (0 until nTopic).map(i => s"t${comm}_w${Rng.zipf(40, 1.05, cfg.seed, pid, 7L + i)}")
    val nSub = 2 + Rng.uniformInt(2, cfg.seed, pid, 15L)
    val sub = (0 until nSub).map(i => s"st${team}_w${Rng.zipf(15, 1.05, cfg.seed, pid, 16L + i)}")
    // Every co-author from another team leaves one subtopic word of their
    // home team in the title — a guest paper still carries a trace of the
    // guest's research fingerprint (what lets GCN re-attach one-off papers).
    val guestSub = paperAuthors(pid, cfg)
      .map(a => teamOf(a, cfg))
      .distinct
      .filterNot(_ == team)
      .map(t => s"st${t}_w${Rng.zipf(15, 1.05, cfg.seed, pid, 90L + t)}")
    val nStop = 1 + Rng.uniformInt(3, cfg.seed, pid, 20L)
    val stop = (0 until nStop).map(i => s"g_w${Rng.zipf(200, 1.1, cfg.seed, pid, 21L + i)}")
    val sig =
      if (Rng.uniform(cfg.seed, pid, 30L) < 0.35)
        Seq(s"sig_t${team}_${Rng.uniformInt(2, cfg.seed, pid, 31L)}")
      else Seq.empty
    (topic ++ sub ++ guestSub ++ sig ++ stop).distinct
  }

  /** Venue of one paper: the team's representative venue (drawn from the
    * community pool — different teams usually differ) / another community
    * venue / a global high-frequency venue.
    */
  def paperVenue(pid: Long, team: Int, cfg: Config): String = {
    val comm = communityOf(team, cfg)
    val repIdx = ((Rng.mix(cfg.seed, team.toLong, 0x7E9EL) >>> 1) % cfg.venuesPerComm).toInt
    val u = Rng.uniform(cfg.seed, pid, 40L)
    if (u < 0.55) s"v${comm * cfg.venuesPerComm + repIdx}"
    else if (u < 0.80) s"v${comm * cfg.venuesPerComm + Rng.uniformInt(cfg.venuesPerComm, cfg.seed, pid, 41L)}"
    else s"gv${Rng.zipf(20, 1.1, cfg.seed, pid, 42L)}"
  }

  def paperYear(pid: Long, team: Int, cfg: Config): Int =
    teamStartYear(team, cfg) +
      (Rng.mix(cfg.seed, pid, 50L) >>> 33).toInt % teamYearSpan(team, cfg)

  /** Full paper record (team re-derived from pid so this stays pure). */
  def paperOf(pid: Long, cfg: Config): Paper = {
    val team = paperTeam(pid, cfg)
    Paper(pid, paperTitle(pid, team, cfg), paperVenue(pid, team, cfg), paperYear(pid, team, cfg))
  }

  /** papers DataFrame: (pid LONG, title ARRAY<STRING>, venue STRING, year INT). */
  def papers(spark: SparkSession, cfg: Config = Config()): DataFrame = {
    import spark.implicits._
    spark.range(cfg.nPapers).as[Long].map(paperOf(_, cfg)).toDF()
  }

  /** authorships DataFrame: (pid LONG, authorId LONG, name STRING).
    *
    * If a random collaboration would put two namesakes on one paper, only the
    * lowest author id keeps the slot — occurrences are keyed by (pid, name),
    * so the ground truth must be unique per key.
    */
  def authorships(spark: SparkSession, cfg: Config = Config()): DataFrame = {
    import spark.implicits._
    val names = spark.sparkContext.broadcast(buildNames(cfg))
    spark
      .range(cfg.nPapers)
      .as[Long]
      .flatMap { pid =>
        val as = paperAuthors(pid, cfg).sorted
        val seen = scala.collection.mutable.HashSet.empty[String]
        as.flatMap { a =>
          val n = names.value(a.toInt)
          if (seen.add(n)) Some(Authorship(pid, a, n)) else None
        }
      }
      .toDF()
  }

  /** Convenience: both tables with one Config. */
  def generate(spark: SparkSession, cfg: Config = Config()): (DataFrame, DataFrame) =
    (papers(spark, cfg), authorships(spark, cfg))
}
