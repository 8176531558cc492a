package repro.spark

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.core._

/** Structured Streaming execution of a CEP evaluation plan: the pattern's
  * per-type sub-streams are chained through stream–stream inner joins in plan
  * order, with event-time watermarks and interval join conditions so state is
  * bounded — the "CEP pattern detection plans as Structured Streaming
  * join/window operators with optimized join ordering" dataflow.
  *
  * Spark's stream–stream join demands an equality predicate, so each side also
  * carries a coarse time bucket `⌊ts/W⌋`: the chain anchor keeps its bucket and
  * every joined sub-stream is replicated to buckets {b-1, b, b+1}. Two events
  * within W differ by at most one bucket, hence share exactly one replica key —
  * no match is lost and none is duplicated.
  *
  * Pure AND-normalized patterns (no NOT/KL). The input streaming DataFrame has
  * the batch schema [typeId, ts, serial, diff, price]; an `eventTime` timestamp
  * column (seconds = `ts`) is derived for watermarking. Matches equal the batch
  * [[JoinPlanRunner]] results (asserted by tests).
  */
object StreamingRunner {

  /** Per-element watermarked sub-stream with `e{i}_` prefixed columns. When
    * `replicate` is set the rows are exploded to the three adjacent bucket keys.
    */
  private def elemStream(
      stream: DataFrame,
      positive: SimplePattern,
      i: Int,
      delay: String,
      replicate: Boolean,
  ): DataFrame = {
    val e = positive.elems(i)
    val w = positive.window
    val bucket = floor(col("ts") / w).cast("long")
    val keyCol =
      if (replicate) explode(array(bucket - 1, bucket, bucket + 1)) else bucket
    stream
      .filter(col("typeId") === e.typeId)
      .withColumn("eventTime", timestamp_seconds(col("ts")))
      .withWatermark("eventTime", delay)
      .select(
        keyCol as s"e${i}_bucket",
        col("eventTime") as s"e${i}_time",
        col("ts") as s"e${i}_ts",
        col("serial") as s"e${i}_serial",
        col("diff") as s"e${i}_diff",
        col("price") as s"e${i}_price",
      )
  }

  /** Join condition between the bound element set (anchored at `anchor`) and the
    * new element `j`: bucket equality, pattern predicates, pairwise window
    * constraints, and event-time interval constraints for state cleanup.
    */
  private def condition(positive: SimplePattern, left: Set[Int], anchor: Int, j: Int): Column = {
    val w = positive.window
    val iv = w.toInt + 1
    val preds = positive.preds.collect {
      case p if (left(p.i) && p.j == j) || (left(p.j) && p.i == j) => JoinPlanRunner.predColumn(p)
    }
    val windows = left.toVector.sorted.map { i =>
      abs(col(s"e${i}_ts") - col(s"e${j}_ts")) <= lit(w)
    }
    // The interval constraint references only the anchor's event-time column —
    // the intermediate keeps a single event-time attribute (the others are
    // dropped after each join), which Spark requires for chained stateful joins.
    val interval = Vector(
      col(s"e${j}_time") >= col(s"e${anchor}_time") - expr(s"INTERVAL $iv SECONDS"),
      col(s"e${j}_time") <= col(s"e${anchor}_time") + expr(s"INTERVAL $iv SECONDS"),
    )
    val key = col(s"e${anchor}_bucket") === col(s"e${j}_bucket")
    (key +: (preds ++ windows ++ interval)).reduce(_ && _)
  }

  /** The streaming match relation for an order-based plan (left-deep chain of
    * stream–stream joins), projected to per-element serial columns.
    */
  def matchesStream(stream: DataFrame, branch: PlannedBranch, delay: String = "10 seconds"): DataFrame = {
    val positive = branch.positive
    require(branch.negs.isEmpty && positive.isPure, "streaming runner supports pure patterns")
    val order = branch.plan.left
      .getOrElse(throw new IllegalArgumentException("streaming runner needs an order-based plan"))
      .order
    val anchor = order.head
    val first = elemStream(stream, positive, anchor, delay, replicate = false)
    val (joined, _) = order.tail.foldLeft((first, Set(anchor))) { case ((df, bound), j) =>
      val right = elemStream(stream, positive, j, delay, replicate = true)
      (df.join(right, condition(positive, bound, anchor, j)).drop(s"e${j}_time"), bound + j)
    }
    joined.select(positive.elems.indices.map(i => col(s"e${i}_serial")): _*)
  }
}
