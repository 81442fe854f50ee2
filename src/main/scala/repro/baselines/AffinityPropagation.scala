package repro.baselines

/** Affinity Propagation (Frey & Dueck 2007) over a similarity matrix.
  * Used by the GHOST and NetE baselines. Driver-side, per-name group.
  */
object AffinityPropagation {

  /** @param sim        n×n similarity (s(i,i) is overwritten by `preference`)
    * @param preference self-similarity; default = median off-diagonal sim
    * @param damping    update damping in (0, 1)
    * @return exemplar-based cluster labels (dense, 0-based)
    */
  def cluster(
      sim: Array[Array[Double]],
      preference: Option[Double] = None,
      damping: Double = 0.7,
      maxIters: Int = 200,
      convergenceIters: Int = 15,
  ): Array[Int] = {
    val n = sim.length
    if (n == 0) return Array.empty
    if (n == 1) return Array(0)

    // Tiny deterministic symmetry-breaking noise (as sklearn does): perfectly
    // symmetric inputs otherwise leave r(k,k)+a(k,k) exactly at the 0
    // decision boundary and no exemplar ever emerges.
    val s = Array.tabulate(n, n)((i, j) =>
      sim(i)(j) + 1e-9 * repro.util.Rng.uniform(0xAFF1L, i.toLong, j.toLong))
    val pref = preference.getOrElse {
      val off = for (i <- 0 until n; j <- 0 until n if i != j) yield sim(i)(j)
      val sorted = off.sorted
      if (sorted.isEmpty) 0.0 else sorted(sorted.size / 2)
    }
    (0 until n).foreach(i => s(i)(i) = pref)

    val r = Array.ofDim[Double](n, n)
    val a = Array.ofDim[Double](n, n)
    var lastExemplars: Set[Int] = Set.empty
    var stable = 0
    var it = 0
    while (it < maxIters && stable < convergenceIters) {
      // responsibilities
      var i = 0
      while (i < n) {
        var max1 = Double.NegativeInfinity; var max2 = Double.NegativeInfinity; var argmax = -1
        var k = 0
        while (k < n) {
          val v = a(i)(k) + s(i)(k)
          if (v > max1) { max2 = max1; max1 = v; argmax = k }
          else if (v > max2) max2 = v
          k += 1
        }
        k = 0
        while (k < n) {
          val newR = s(i)(k) - (if (k == argmax) max2 else max1)
          r(i)(k) = damping * r(i)(k) + (1 - damping) * newR
          k += 1
        }
        i += 1
      }
      // availabilities
      var k = 0
      while (k < n) {
        var sumPos = 0.0
        var i2 = 0
        while (i2 < n) { if (i2 != k) sumPos += math.max(0.0, r(i2)(k)); i2 += 1 }
        i2 = 0
        while (i2 < n) {
          val newA =
            if (i2 == k) sumPos
            else math.min(0.0, r(k)(k) + sumPos - math.max(0.0, r(i2)(k)))
          a(i2)(k) = damping * a(i2)(k) + (1 - damping) * newA
          i2 += 1
        }
        k += 1
      }
      val exemplars = (0 until n).filter(x => r(x)(x) + a(x)(x) > 0).toSet
      if (exemplars == lastExemplars && exemplars.nonEmpty) stable += 1 else stable = 0
      lastExemplars = exemplars
      it += 1
    }

    val exemplars = if (lastExemplars.nonEmpty) lastExemplars.toArray.sorted else Array(0)
    val labelOfExemplar = exemplars.zipWithIndex.toMap
    (0 until n).map { i =>
      if (labelOfExemplar.contains(i)) labelOfExemplar(i)
      else {
        val k = exemplars.maxBy(e => s(i)(e))
        labelOfExemplar(k)
      }
    }.toArray
  }
}
