package repro.baselines

import repro.SparkSpec

class DbscanSpec extends SparkSpec {

  private def distFromPoints(pts: Array[Double]): Array[Array[Double]] =
    Array.tabulate(pts.length, pts.length)((i, j) => math.abs(pts(i) - pts(j)))

  test("empty input") {
    assert(Dbscan.cluster(Array.empty, 0.5, 2).isEmpty)
  }

  test("two dense blobs separate") {
    val d = distFromPoints(Array(0.0, 0.1, 0.2, 10.0, 10.1, 10.2))
    val l = Dbscan.cluster(d, eps = 0.5, minPts = 2)
    assert(l(0) === l(1) && l(1) === l(2))
    assert(l(3) === l(4) && l(4) === l(5))
    assert(l(0) !== l(3))
  }

  test("noise points become singletons") {
    val d = distFromPoints(Array(0.0, 0.1, 50.0))
    val l = Dbscan.cluster(d, eps = 0.5, minPts = 2)
    assert(l(0) === l(1))
    assert(l(2) !== l(0))
    assert(l.distinct.length === 2)
  }

  test("minPts larger than any neighbourhood makes everything noise") {
    val d = distFromPoints(Array(0.0, 1.0, 2.0))
    val l = Dbscan.cluster(d, eps = 0.1, minPts = 3)
    assert(l.distinct.length === 3)
  }

  test("density chain connects through core points") {
    val d = distFromPoints(Array(0.0, 0.4, 0.8, 1.2))
    val l = Dbscan.cluster(d, eps = 0.5, minPts = 2)
    assert(l.distinct.length === 1)
  }

  test("kDistEps returns a positive, data-dependent radius") {
    val d = distFromPoints(Array(0.0, 0.2, 0.4, 5.0))
    val eps = Dbscan.kDistEps(d, 2)
    assert(eps > 0.0)
    assert(eps < 5.0)
  }

  test("kDistEps degenerate input") {
    assert(Dbscan.kDistEps(Array(Array(0.0)), 2) === 0.5)
  }

  test("labels cover every point") {
    val d = distFromPoints(Array(0.0, 0.1, 3.0, 3.1, 9.9))
    val l = Dbscan.cluster(d, 0.5, 2)
    assert(l.length === 5)
    assert(l.forall(_ >= 0))
  }
}
