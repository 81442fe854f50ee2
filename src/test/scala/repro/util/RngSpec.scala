package repro.util

import org.scalacheck.Gen
import repro.PropChecks
import repro.SparkSpec

class RngSpec extends SparkSpec with PropChecks {

  test("mix is deterministic") {
    assert(Rng.mix(1L, 2L, 3L) === Rng.mix(1L, 2L, 3L))
  }

  test("mix is order-sensitive") {
    assert(Rng.mix(1L, 2L) !== Rng.mix(2L, 1L))
  }

  test("uniform stays in [0, 1)") {
    forAll(Gen.long, Gen.long) { (a, b) =>
      val u = Rng.uniform(a, b)
      assert(u >= 0.0 && u < 1.0)
    }
  }

  test("uniformInt stays in range and rejects n <= 0") {
    forAll(Gen.choose(1, 1000), Gen.long) { (n, s) =>
      val v = Rng.uniformInt(n, s)
      assert(v >= 0 && v < n)
    }
    intercept[IllegalArgumentException] { Rng.uniformInt(0, 1L) }
  }

  test("uniform has roughly uniform mean") {
    val mean = (0 until 20000).map(i => Rng.uniform(99L, i.toLong)).sum / 20000.0
    assert(math.abs(mean - 0.5) < 0.02, s"mean $mean")
  }

  test("gaussian has roughly standard moments") {
    val xs = (0 until 20000).map(i => Rng.gaussian(7L, i.toLong))
    val mean = xs.sum / xs.size
    val sd = math.sqrt(xs.map(x => (x - mean) * (x - mean)).sum / xs.size)
    assert(math.abs(mean) < 0.05, s"mean $mean")
    assert(math.abs(sd - 1.0) < 0.05, s"sd $sd")
  }

  test("zipf stays in range") {
    forAll(Gen.choose(1, 500), Gen.long) { (n, s) =>
      val v = Rng.zipf(n, 1.1, s)
      assert(v >= 0 && v < n)
    }
  }

  test("zipf is skewed toward low ranks") {
    val draws = (0 until 20000).map(i => Rng.zipf(100, 1.2, 3L, i.toLong))
    val topShare = draws.count(_ < 10).toDouble / draws.size
    assert(topShare > 0.4, s"top-10 share $topShare — not heavy-tailed")
    // and the tail is still populated
    assert(draws.exists(_ > 50))
  }

  test("zipf handles alpha == 1 (log-uniform branch)") {
    val draws = (0 until 5000).map(i => Rng.zipf(50, 1.0, 11L, i.toLong))
    assert(draws.forall(d => d >= 0 && d < 50))
    assert(draws.count(_ == 0) > draws.count(_ == 40))
  }
}
