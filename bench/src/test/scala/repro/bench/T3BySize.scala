package repro.bench

import repro.SparkSpec
import repro.core._

/** Table T3 (paper Figs 6–15): throughput and memory by pattern size per category. */
class T3BySize extends SparkSpec {

  test("T3: throughput and memory by pattern size (Figs 6-15)") {
    val (text, runs) = Tables.t3(spark)
    println(text)

    // Shape: the partial-match burden of the native baselines grows with
    // pattern size (the Figs 7/9/…/15 memory trend), and the JQPG advantage
    // over the native baselines does not invert as patterns grow (§7.3 reports
    // the relative gain increasing with size). Absolute per-event throughput is
    // not monotone in size on this workload — larger patterns carry more
    // predicates, which help well-planned executions — so the assertions are on
    // relative quantities.
    def tput(a: Algo, s: Int): Double =
      BenchWorld.gmean(runs.filter(r => r.algo == a && r.size == s).map(_.throughput))
    def mem(a: Algo, s: Int): Double =
      BenchWorld.gmean(runs.filter(r => r.algo == a && r.size == s).map(_.peakLive.toDouble.max(1)))
    for (a <- Seq(TRIVIAL, EFREQ, ZSTREAM))
      assert(mem(a, 7) > mem(a, 3), s"$a: native baseline memory should grow with size")
    val gain3 = tput(DP_B, 3) / tput(ZSTREAM, 3)
    val gain7 = tput(DP_B, 7) / tput(ZSTREAM, 7)
    assert(gain7 > gain3 * 0.8, s"DP-B/ZSTREAM gain should not shrink with size: $gain3 -> $gain7")
    val og3 = tput(DP_LD, 3) / tput(TRIVIAL, 3)
    val og7 = tput(DP_LD, 7) / tput(TRIVIAL, 7)
    assert(og7 > og3 * 0.8, s"DP-LD/TRIVIAL gain should not shrink with size: $og3 -> $og7")
  }
}
