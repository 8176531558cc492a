package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.cep.Event
import repro.core._

/** Configuration of the synthetic NASDAQ-like tick stream (§7.2 substitution).
  *
  * The paper's dataset: 1 year of price updates, 2100 symbols, 80.5M events,
  * rates 1–45 ev/s, window 20 min (⇒ up to 54k events of one type per window —
  * which is why their experiments took 1.5 months). We scale the time axis:
  * rates are log-uniform in [rateMin, rateMax] per abstract time unit and the
  * window is ~1 unit, keeping per-window buffers laptop-sized while preserving
  * the rate skew that drives plan quality differences.
  *
  * @param nTypes  number of stock symbols (event types)
  * @param horizon stream duration in time units
  * @param rateMin minimum arrival rate (events per unit)
  * @param rateMax maximum arrival rate (events per unit)
  * @param window  pattern time window W (time units)
  * @param seed    master seed — generation is deterministic in (cfg)
  */
final case class StockConfig(
    nTypes: Int = 20,
    horizon: Double = 200.0,
    rateMin: Double = 1.0,
    rateMax: Double = 20.0,
    window: Double = 1.0,
    seed: Long = 7,
)

/** Synthetic stock-tick stream generation and statistics measurement.
  *
  * Events carry `difference` (the preprocessed price-delta attribute of §7.2,
  * standard normal here) and a price. Arrival processes are Poisson-like: a
  * deterministic per-type count `r_i·horizon` with i.i.d. uniform timestamps.
  * Rates and predicate selectivities are *measured* from the generated stream
  * (Spark aggregations / empirical quantiles), mirroring the paper's
  * preprocessing stage.
  */
object StockData {

  /** Deterministic log-uniform per-type rates. */
  def configuredRates(cfg: StockConfig): Vector[Double] = {
    val rnd = new scala.util.Random(cfg.seed)
    Vector.fill(cfg.nTypes) {
      math.exp(math.log(cfg.rateMin) + rnd.nextDouble() * (math.log(cfg.rateMax) - math.log(cfg.rateMin)))
    }
  }

  /** The tick stream as a DataFrame [typeId, ts, serial, diff, price], serial
    * strictly increasing with ts.
    */
  def streamDF(spark: SparkSession, cfg: StockConfig): DataFrame = {
    val rates = configuredRates(cfg)
    val perType = rates.zipWithIndex.map { case (r, i) =>
      val nEv = math.max(1L, math.round(r * cfg.horizon))
      spark.range(nEv).select(
        lit(i) as "typeId",
        (rand(cfg.seed + 31L * i) * cfg.horizon) as "ts",
        randn(cfg.seed + 1013L * i + 1) as "diff",
        (lit(100.0) + randn(cfg.seed + 1013L * i + 2) * 10.0) as "price",
      )
    }
    val all = perType.reduce(_ unionAll _)
    // Serial numbers: the stream position attribute used by contiguity (§6.2).
    // A single-partition window sort is fine at these scales.
    all
      .withColumn("serial", row_number().over(Window.orderBy("ts", "typeId")).cast("long") - 1)
      .select("typeId", "ts", "serial", "diff", "price")
  }

  /** Collect the stream to the driver, sorted by serial, as engine events. */
  def collectEvents(df: DataFrame): Array[Event] =
    df.select("typeId", "ts", "serial", "diff", "price")
      .collect()
      .map(r => Event(r.getInt(0), r.getDouble(1), r.getLong(2), Array(r.getDouble(3), r.getDouble(4))))
      .sortBy(_.serial)

  /** Arrival rates measured from the stream (Spark aggregation, as in §7.2). */
  def measuredRates(df: DataFrame, horizon: Double): Map[Int, Double] =
    df.groupBy("typeId")
      .agg(count(lit(1)) as "n")
      .collect()
      .map(r => r.getInt(0) -> r.getLong(1).toDouble / horizon)
      .toMap

  /** Up to `maxPerType` `difference` samples per type, sorted ascending — the
    * empirical distributions used for selectivity measurement and for dialing
    * predicate shifts to target selectivities.
    */
  def diffSamples(df: DataFrame, maxPerType: Int = 2000): Map[Int, Array[Double]] =
    df.select("typeId", "diff", "serial")
      .collect()
      .groupBy(_.getInt(0))
      .map { case (t, rows) =>
        t -> rows.sortBy(_.getLong(2)).take(maxPerType).map(_.getDouble(1)).sorted
      }
}

/** Statistics provider backed by measured stream statistics (§7.2: "all arrival
  * rates and predicate selectivities were calculated during the preprocessing
  * stage").
  *
  * @param rates     measured per-type arrival rates
  * @param diffs     sorted per-type `difference` samples
  * @param window    pattern window W
  * @param totalRate total stream rate (for the contiguity adjacency estimate)
  */
final class MeasuredStatsProvider(
    rates: Map[Int, Double],
    diffs: Map[Int, Array[Double]],
    val window: Double,
    totalRate: Double,
) extends StatsProvider {

  override def rate(elem: Elem): Double = rates(elem.typeId)

  override def predSelectivity(a: Elem, b: Elem, op: PredOp): Double = op match {
    case TsLess => 0.5 // pairwise independence approximation for order constraints
    case SerialSucc =>
      // P(two window-mates are stream-adjacent) ≈ 1/(W · total rate).
      math.min(1.0, 1.0 / (window * totalRate))
    case AttrCmp(attr, shift, less) =>
      require(attr == 0, "selectivity measurement is defined on the difference attribute")
      val xs = diffs(a.typeId)
      val ys = diffs(b.typeId)
      // P(x + shift < y) over independent samples, via binary search on sorted ys.
      var hits = 0L
      var i = 0
      while (i < xs.length) {
        val t = xs(i) + shift
        var lo = 0; var hi = ys.length
        while (lo < hi) { val m = (lo + hi) >>> 1; if (ys(m) <= t) lo = m + 1 else hi = m }
        hits += ys.length - lo
        i += 1
      }
      val p = hits.toDouble / (xs.length.toDouble * ys.length)
      val pLess = math.max(1e-4, math.min(1.0 - 1e-4, p)) // clamp away from 0/1
      if (less) pLess else 1.0 - pLess
  }

  /** Shift θ such that P(x + θ < y) ≈ target, from the empirical distribution of
    * cross differences d = y − x (θ = quantile of d at 1 − target).
    */
  def shiftForTargetSelectivity(aType: Int, bType: Int, target: Double, seed: Long): Double = {
    val rnd = new scala.util.Random(seed)
    val xs = diffs(aType)
    val ys = diffs(bType)
    val m = 4000
    val ds = Array.fill(m)(ys(rnd.nextInt(ys.length)) - xs(rnd.nextInt(xs.length))).sorted
    val q = math.max(0, math.min(m - 1, math.round((1.0 - target) * (m - 1)).toInt))
    ds(q)
  }
}
