package repro.baselines

/** DBSCAN over a precomputed distance matrix — the offline stand-in for
  * HDBSCAN inside the NetE baseline (DESIGN.md §5.5). Noise points become
  * singleton clusters so every paper always gets a label.
  */
object Dbscan {

  /** @param dist   symmetric n×n distance matrix
    * @param eps    neighbourhood radius
    * @param minPts core-point density threshold (including the point itself)
    * @return dense 0-based cluster labels; noise = singleton clusters
    */
  def cluster(dist: Array[Array[Double]], eps: Double, minPts: Int): Array[Int] = {
    val n = dist.length
    if (n == 0) return Array.empty
    val labels = Array.fill(n)(-1) // -1 unvisited/noise
    var next = 0

    def neighbors(i: Int): Array[Int] =
      (0 until n).filter(j => dist(i)(j) <= eps).toArray

    var i = 0
    while (i < n) {
      if (labels(i) == -1) {
        val nbrs = neighbors(i)
        if (nbrs.length >= minPts) {
          val cid = next; next += 1
          labels(i) = cid
          val queue = scala.collection.mutable.Queue(nbrs.toIndexedSeq: _*)
          while (queue.nonEmpty) {
            val q = queue.dequeue()
            if (labels(q) == -1) {
              labels(q) = cid
              val qn = neighbors(q)
              if (qn.length >= minPts) queue.enqueueAll(qn.filter(labels(_) == -1))
            }
          }
        }
      }
      i += 1
    }
    // Noise → singletons.
    var j = 0
    while (j < n) {
      if (labels(j) == -1) { labels(j) = next; next += 1 }
      j += 1
    }
    labels
  }

  /** k-dist heuristic for eps: the median of each point's k-th nearest
    * distance. Keeps the NetE stand-in parameter-light per name.
    */
  def kDistEps(dist: Array[Array[Double]], k: Int): Double = {
    val n = dist.length
    if (n <= 1) return 0.5
    val kth = (0 until n).map { i =>
      val ds = (0 until n).filter(_ != i).map(j => dist(i)(j)).sorted
      ds(math.min(k - 1, ds.size - 1))
    }.sorted
    kth(kth.size / 2)
  }
}
