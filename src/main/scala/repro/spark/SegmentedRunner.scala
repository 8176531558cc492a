package repro.spark

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.cep.{CepMatch, Event, EngineConfig, NfaEngine, TreeEngine}
import repro.core.PlannedBranch

/** One stream event as a Dataset row. */
final case class EventRow(typeId: Int, ts: Double, serial: Long, diff: Double, price: Double)

/** One detected match: per-element serial lists plus the window-alignment key. */
final case class MatchRow(seg: Long, serials: Seq[Seq[Long]], minTs: Double)

/** Distributed CEP execution on Spark: the stream is split into half-open
  * segments of length L ≥ W with a W-sized overlap, the (serializable)
  * evaluation engine runs per segment inside `flatMapGroups`, and matches are
  * de-duplicated exactly by attributing each match to the segment containing its
  * earliest event.
  *
  * Every match spans ≤ W time, hence lies fully inside segment
  * `k = ⌊minTs/L⌋` = `[kL, (k+1)L + W)`; each event is replicated to at most two
  * segments. Results are therefore identical to a single driver-side run
  * (asserted by tests). This also covers interior negation (§5.3): a candidate
  * negated event must temporally follow some bound positive, so it lies in
  * `(minTs, minTs + W) ⊂ [kL, (k+1)L + W)` — the same segment as the match.
  */
object SegmentedRunner {

  /** Assign each event to the segments whose extended range [kL, (k+1)L+W)
    * contains it: its own segment, plus the previous one when within W of the
    * boundary.
    */
  def withSegments(events: DataFrame, segLen: Double, window: Double): DataFrame = {
    val own = floor(col("ts") / segLen).cast("long")
    events.select(
      explode(
        when(col("ts") - own * segLen < window && own > 0, array(own, own - 1))
          .otherwise(array(own))
      ) as "seg",
      col("typeId"), col("ts"), col("serial"), col("diff"), col("price"),
    )
  }

  /** Run the branch's engine per segment and return the exact global match set. */
  def run(
      spark: SparkSession,
      events: DataFrame,
      branch: PlannedBranch,
      config: EngineConfig = EngineConfig(),
      segLen: Double = -1.0,
  ): Dataset[MatchRow] = {
    import spark.implicits._
    val w = branch.positive.window
    val L = if (segLen > 0) segLen else 2.0 * w
    require(L >= w, s"segment length $L must be at least the window $w")
    val segmented = withSegments(events, L, w)
    segmented
      .select(col("seg"), col("typeId"), col("ts"), col("serial"), col("diff"), col("price"))
      .as[(Long, Int, Double, Long, Double, Double)]
      .groupByKey(_._1)
      .flatMapGroups { (seg, rows) =>
        val evs = rows
          .map { case (_, t, ts, serial, diff, price) => Event(t, ts, serial, Array(diff, price)) }
          .toArray
          .sortBy(e => (e.ts, e.serial))
        val engine =
          if (branch.plan.isLeft) new NfaEngine(branch, config) else new TreeEngine(branch, config)
        engine
          .run(scala.collection.immutable.ArraySeq.unsafeWrapArray(evs))
          .matches
          .iterator
          .filter(m => math.floor(m.minTs / L).toLong == seg)
          .map(m => MatchRow(seg, m.byElem.map(_.toSeq), m.minTs))
      }
  }

  /** Driver-side reference run over the full stream (for tests/benches). */
  def runLocal(events: Array[Event], branch: PlannedBranch, config: EngineConfig = EngineConfig())
      : Vector[CepMatch] = {
    val engine =
      if (branch.plan.isLeft) new NfaEngine(branch, config) else new TreeEngine(branch, config)
    engine.run(scala.collection.immutable.ArraySeq.unsafeWrapArray(events)).matches
  }
}
