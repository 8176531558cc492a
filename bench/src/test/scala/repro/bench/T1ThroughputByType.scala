package repro.bench

import repro.SparkSpec
import repro.core._

/** Table T1 (paper Fig 4): mean throughput per pattern category × algorithm. */
class T1ThroughputByType extends SparkSpec {

  test("T1: throughput by pattern category (Fig 4)") {
    val (text, runs) = Tables.t1(spark)
    println(text)

    // Shape assertions mirroring §7.3: adapted JQPG planners beat the native
    // CEP baselines on average (gentle slack for timing noise).
    def mean(a: Algo): Double = BenchWorld.gmean(runs.filter(_.algo == a).map(_.throughput))
    assert(mean(DP_LD) > mean(EFREQ) * 1.05, s"DP-LD ${mean(DP_LD)} vs EFREQ ${mean(EFREQ)}")
    assert(mean(DP_LD) > mean(TRIVIAL), "DP-LD vs TRIVIAL")
    assert(mean(DP_B) > mean(ZSTREAM) * 1.05, s"DP-B ${mean(DP_B)} vs ZSTREAM ${mean(ZSTREAM)}")
    assert(mean(GREEDY) > mean(TRIVIAL) * 0.9, "GREEDY should not trail TRIVIAL")
  }
}
