package repro.bench

import repro.SparkSpec
import repro.core._

/** Table T7 (paper Fig 19): throughput of the sequence-pattern set under the
  * three event selection strategies (§6.2).
  */
class T7SelectionStrategies extends SparkSpec {

  test("T7: throughput under event selection strategies (Fig 19)") {
    val (text, runs) = Tables.t7(spark)
    println(text)

    def tput(sname: String, a: Algo): Double =
      BenchWorld.gmean(runs.filter(r => r._1 == sname && r._2.algo == a).map(_._2.throughput))
    def overallTput(sname: String): Double =
      BenchWorld.gmean(runs.filter(_._1 == sname).map(_._2.throughput))
    def overallPm(sname: String): Double =
      BenchWorld.gmean(runs.filter(_._1 == sname).map(_._2.pmCreated.toDouble.max(1)))

    // §7.3 shapes, asserted on the deterministic partial-match counts (wall
    // clock is noisy between strategies of similar cost): restricting the
    // strategy prunes partial matches — any > next > contiguity; contiguity is
    // far faster than skip-till-any; JQPG planners keep an edge under
    // skip-till-next; under contiguity the trivial static plan is competitive.
    assert(overallPm("skip-till-any") > overallPm("skip-till-next"),
      s"any-PMs ${overallPm("skip-till-any")} vs next-PMs ${overallPm("skip-till-next")}")
    assert(overallPm("skip-till-next") > overallPm("contiguity"))
    assert(overallTput("contiguity") > overallTput("skip-till-any") * 1.2)
    assert(tput("skip-till-next", DP_LD) > tput("skip-till-next", TRIVIAL) * 0.9)
    val bestContig = Algo.all.map(a => tput("contiguity", a)).max
    assert(tput("contiguity", TRIVIAL) > bestContig * 0.5,
      "TRIVIAL should be competitive under contiguity")
  }
}
