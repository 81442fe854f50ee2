package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Shared benchmark fixtures: one corpus per JVM at BENCH_SF (default 0.1,
  * ~64 k papers — the "SF=0.1" benchmark scale). Every TableXBench prints the
  * paper's numbers next to ours; EXPERIMENTS.md records both.
  */
object Bench {
  val sf: Double = sys.env.getOrElse("BENCH_SF", "0.1").toDouble
  val seed: Long = sys.env.getOrElse("BENCH_SEED", "42").toLong

  lazy val corpus: Experiments.Corpus = Experiments.corpus(SparkSpec.shared, sf, seed)

  /** IUAD run shared between Table III and Table IV benches. */
  lazy val iuad: (repro.core.Iuad.Result, repro.core.Model.Metrics, repro.core.Model.Metrics) =
    Experiments.runIuad(SparkSpec.shared, corpus)

  def banner(title: String): Unit = {
    println()
    println(s"=== $title (sf=$sf seed=$seed) ===")
  }
}

/** Base trait adding the shared session to bench suites. */
trait BenchSpec extends SparkSpec
