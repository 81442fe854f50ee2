package repro.baselines

/** Hierarchical agglomerative clustering over a precomputed similarity
  * matrix (driver-side; baselines run it per name, where n is small).
  * Merging stops when the best linkage similarity drops below `threshold`.
  */
object Hac {

  sealed trait Linkage
  case object Single extends Linkage
  case object Complete extends Linkage
  case object Average extends Linkage

  /** @param sim       symmetric n×n similarity matrix (higher = closer)
    * @param threshold stop when no pair of clusters is ≥ this similar
    * @return cluster label per point (0-based, dense)
    */
  def cluster(sim: Array[Array[Double]], threshold: Double, linkage: Linkage = Average): Array[Int] = {
    val n = sim.length
    if (n == 0) return Array.empty
    var clusters: Vector[Vector[Int]] = (0 until n).map(Vector(_)).toVector

    def linkSim(a: Vector[Int], b: Vector[Int]): Double = {
      val sims = for (i <- a; j <- b) yield sim(i)(j)
      linkage match {
        case Single   => sims.max
        case Complete => sims.min
        case Average  => sims.sum / sims.size
      }
    }

    var done = false
    while (!done && clusters.size > 1) {
      var bi = -1; var bj = -1; var best = Double.NegativeInfinity
      var i = 0
      while (i < clusters.size) {
        var j = i + 1
        while (j < clusters.size) {
          val s = linkSim(clusters(i), clusters(j))
          if (s > best) { best = s; bi = i; bj = j }
          j += 1
        }
        i += 1
      }
      if (best >= threshold) {
        val merged = clusters(bi) ++ clusters(bj)
        clusters = clusters.zipWithIndex.collect { case (c, k) if k != bi && k != bj => c } :+ merged
      } else done = true
    }

    val labels = new Array[Int](n)
    clusters.zipWithIndex.foreach { case (c, k) => c.foreach(p => labels(p) = k) }
    labels
  }
}
