package repro.bench

import repro.SparkSpec

/** Table T4 (paper Fig 16): quality of the cost functions — Spearman rank
  * correlation of plan cost with measured 1/throughput and memory.
  */
class T4CostModelFit extends SparkSpec {

  test("T4: cost model predicts throughput and memory (Fig 16)") {
    val (text, rhos) = Tables.t4(spark)
    println(text)
    for ((name, (rhoT, rhoM, rhoP)) <- rhos) {
      // The deterministic structural quantities (live/created partial matches)
      // must track cost tightly; wall-clock throughput is JIT/GC-noisy for
      // cheap plans, so its threshold is looser.
      assert(rhoP > 0.6, s"$name: created-PM correlation too weak: $rhoP")
      assert(rhoM > 0.5, s"$name: memory correlation too weak: $rhoM")
      assert(rhoT > 0.25, s"$name: throughput correlation too weak: $rhoT")
    }
  }
}
