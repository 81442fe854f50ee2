package repro.core

import org.apache.spark.sql.DataFrame

/** Shared row types of the IUAD pipeline.
  *
  * Vertex ids are strings: `"<name>#c<k>"` for the k-th SCR component of a
  * name, `"<name>#p<pid>"` for a singleton (one isolated vertex per
  * (name, paper) occurrence — see DESIGN.md §5.8). Synthetic names never
  * contain `#`, which keeps the ids self-describing and deterministic.
  */
object Model {

  /** One (paper, name) occurrence from a co-author list. */
  final case class Occurrence(pid: Long, name: String)

  /** η-SCR edge between two names, a < b, with co-occurrence count. */
  final case class ScrEdge(a: String, b: String, cnt: Long)

  /** For name `name`, SCR partner `nbr` lies in neighbour-component `comp`. */
  final case class NeighborComp(name: String, nbr: String, comp: Int)

  /** SCN instance-level edge (between vertex ids). */
  final case class ScnEdge(src: String, dst: String)

  /** Assignment of a paper occurrence to an SCN vertex. */
  final case class VertexPaper(vid: String, name: String, pid: Long)

  /** The stable collaboration network (Stage I output).
    *
    * @param vertices     (vid, name)
    * @param edges        (src, dst) instance-level SCR edges
    * @param vertexPapers (vid, name, pid)
    * @param neighborComp (name, nbr, comp) SCR-partner → component map
    */
  final case class Scn(
      vertices: DataFrame,
      edges: DataFrame,
      vertexPapers: DataFrame,
      neighborComp: DataFrame,
  )

  /** Everything the six similarity functions need about one SCN vertex.
    *
    * @param wordYears one (keyword, year) entry per paper containing it
    * @param cliques   co-author name pairs `"yz"` co-occurring with the
    *                  vertex in one of its papers (triangle shortcut of γ2)
    * @param wl        WL subgraph-kernel feature counts of the ego subgraph
    */
  final case class VertexProfile(
      vid: String,
      name: String,
      pids: Seq[Long],
      wordYears: Seq[(String, Int)],
      venues: Seq[String],
      years: Seq[Int],
      cliques: Seq[String],
      wl: Map[String, Int],
  ) {
    def nPapers: Int = pids.size
  }

  /** Candidate same-name vertex pair with its 6-dim similarity vector. */
  final case class PairGamma(name: String, vi: String, vj: String, g: Seq[Double])

  /** Scored candidate pair (log posterior-odds of being matched). */
  final case class ScoredPair(name: String, vi: String, vj: String, score: Double)

  /** Pairwise micro metrics over same-name paper pairs (§VI-A.2). */
  final case class Metrics(tp: Long, fp: Long, fn: Long, tn: Long) {
    def accuracy: Double = safe(tp + tn, tp + fp + fn + tn)
    def precision: Double = safe(tp, tp + fp)
    def recall: Double = safe(tp, tp + fn)
    def f1: Double = {
      val p = precision; val r = recall
      if (p + r == 0.0) 0.0 else 2 * p * r / (p + r)
    }
    def +(o: Metrics): Metrics = Metrics(tp + o.tp, fp + o.fp, fn + o.fn, tn + o.tn)
    private def safe(num: Long, den: Long): Double = if (den == 0L) 0.0 else num.toDouble / den
    override def toString: String =
      f"Metrics(A=$accuracy%.4f P=$precision%.4f R=$recall%.4f F=$f1%.4f tp=$tp fp=$fp fn=$fn tn=$tn)"
  }
}
