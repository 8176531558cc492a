package repro.data

import repro.SparkSpec
import repro.core._

/** Synthetic stock stream generation and statistics measurement (§7.2). */
class StockDataSpec extends SparkSpec {

  private lazy val cfg = StockConfig(nTypes = 6, horizon = 50.0, rateMin = 1.0, rateMax = 10.0, seed = 11)
  private lazy val df = StockData.streamDF(spark, cfg).cache()

  test("stream schema and row count match configured rates") {
    assert(df.columns.toSet == Set("typeId", "ts", "serial", "diff", "price"))
    val expected = StockData.configuredRates(cfg).map(r => math.max(1L, math.round(r * cfg.horizon))).sum
    assert(df.count() == expected)
  }

  test("generation is deterministic in the config") {
    val again = StockData.streamDF(spark, cfg)
    assert(df.collect().map(_.toString).sorted.sameElements(again.collect().map(_.toString).sorted))
  }

  test("serials are unique, contiguous and increase with ts") {
    val evs = StockData.collectEvents(df)
    assert(evs.map(_.serial).toVector == evs.indices.map(_.toLong).toVector)
    assert(evs.sliding(2).forall { case Array(a, b) => a.ts <= b.ts; case _ => true })
  }

  test("measured rates approximate configured rates (Spark aggregation)") {
    val conf = StockData.configuredRates(cfg)
    val meas = StockData.measuredRates(df, cfg.horizon)
    conf.zipWithIndex.foreach { case (r, i) =>
      assert(math.abs(meas(i) - r) <= math.max(0.5, 0.15 * r), s"type $i: configured $r measured ${meas(i)}")
    }
  }

  test("timestamps stay inside the horizon; diffs are centred") {
    val evs = StockData.collectEvents(df)
    assert(evs.forall(e => e.ts >= 0 && e.ts <= cfg.horizon))
    val mean = evs.map(_.diff).sum / evs.length
    assert(math.abs(mean) < 0.2)
  }

  test("measured AttrCmp selectivity matches a direct empirical count") {
    val diffs = StockData.diffSamples(df)
    val rates = StockData.measuredRates(df, cfg.horizon)
    val provider = new MeasuredStatsProvider(rates, diffs, cfg.window, rates.values.sum)
    val a = Elem(0, "T0"); val b = Elem(1, "T1")
    val sel = provider.predSelectivity(a, b, AttrCmp(0, 0.0, less = true))
    // Both diffs ~ N(0,1) => P(x < y) ≈ 0.5
    assert(sel > 0.35 && sel < 0.65, s"sel=$sel")
    // complementarity
    val selGt = provider.predSelectivity(a, b, AttrCmp(0, 0.0, less = false))
    assert(math.abs(sel + selGt - 1.0) < 1e-6)
  }

  test("shiftForTargetSelectivity dials the measured selectivity to the target") {
    val diffs = StockData.diffSamples(df)
    val rates = StockData.measuredRates(df, cfg.horizon)
    val provider = new MeasuredStatsProvider(rates, diffs, cfg.window, rates.values.sum)
    for (target <- Seq(0.05, 0.2, 0.5, 0.8)) {
      val shift = provider.shiftForTargetSelectivity(0, 1, target, seed = 3)
      val got = provider.predSelectivity(Elem(0, "a"), Elem(1, "b"), AttrCmp(0, shift, less = true))
      assert(math.abs(got - target) < 0.1, s"target=$target got=$got")
    }
  }

  test("TsLess and SerialSucc selectivities follow the documented estimates") {
    val diffs = StockData.diffSamples(df)
    val rates = StockData.measuredRates(df, cfg.horizon)
    val total = rates.values.sum
    val provider = new MeasuredStatsProvider(rates, diffs, cfg.window, total)
    assert(provider.predSelectivity(Elem(0, "a"), Elem(1, "b"), TsLess) == 0.5)
    val ss = provider.predSelectivity(Elem(0, "a"), Elem(1, "b"), SerialSucc)
    assert(math.abs(ss - math.min(1.0, 1.0 / (cfg.window * total))) < 1e-12)
  }
}
