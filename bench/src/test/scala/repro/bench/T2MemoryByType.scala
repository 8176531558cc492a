package repro.bench

import repro.SparkSpec
import repro.core._

/** Table T2 (paper Fig 5): memory (peak live partial matches) per category × algorithm. */
class T2MemoryByType extends SparkSpec {

  test("T2: peak partial matches by pattern category (Fig 5)") {
    val (text, runs) = Tables.t2(spark)
    println(text)

    def mean(a: Algo): Double =
      BenchWorld.gmean(runs.filter(_.algo == a).map(_.peakLive.toDouble.max(1.0)))
    // §7.3: JQPG plans use ~65-85% of EFREQ's memory; DP-B up to ~4x less than ZSTREAM.
    assert(mean(DP_LD) < mean(EFREQ), s"DP-LD ${mean(DP_LD)} vs EFREQ ${mean(EFREQ)}")
    assert(mean(DP_LD) < mean(TRIVIAL))
    assert(mean(DP_B) < mean(ZSTREAM), s"DP-B ${mean(DP_B)} vs ZSTREAM ${mean(ZSTREAM)}")
  }
}
