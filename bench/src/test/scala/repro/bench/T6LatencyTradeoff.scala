package repro.bench

import repro.SparkSpec
import repro.core._

/** Table T6 (paper Fig 18): throughput vs detection latency for the six JQPG
  * planners under the hybrid cost model `Cost^trpt + α·Cost^lat` (§6.1).
  */
class T6LatencyTradeoff extends SparkSpec {

  test("T6: throughput vs latency under the hybrid cost model (Fig 18)") {
    val (text, pts) = Tables.t6(spark)
    println(text)

    // Deterministic shape (model level): raising alpha never raises the chosen
    // plan's latency cost, and at alpha=1 it is strictly lower for several
    // algorithms (plans visibly shift toward late detection of T_n).
    for (a <- Algo.jqpgAlgos) {
      def mlat(al: Double) = pts.filter(p => p.algo == a && p.alpha == al).map(_.modelLat).sum
      assert(mlat(1.0) <= mlat(0.0) + 1e-6, s"$a: model latency grew with alpha")
    }
    val improved = Algo.jqpgAlgos.count { a =>
      pts.filter(p => p.algo == a && p.alpha == 1.0).map(_.modelLat).sum <
        pts.filter(p => p.algo == a && p.alpha == 0.0).map(_.modelLat).sum - 1e-6
    }
    assert(improved >= 2, s"alpha should visibly shift plans for several algorithms ($improved)")
  }
}
