package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoints, one per reproduced table (see DESIGN.md).
  *
  * Example:
  * {{{
  * spark-submit --class repro.jobs.T1Job jobs/target/scala-2.13/repro-jobs_2.13-0.1.0-SNAPSHOT.jar
  * }}}
  */
object Jobs {
  /** Local session mirroring the test harness configuration. */
  def session(name: String): SparkSession =
    SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def run(name: String)(body: SparkSession => String): Unit = {
    val spark = session(name)
    try println(body(spark))
    finally spark.stop()
  }
}

/** Fig 4: mean throughput per pattern category × algorithm. */
object T1Job { def main(args: Array[String]): Unit = Jobs.run("repro-t1")(s => Tables.t1(s)._1) }

/** Fig 5: memory (peak live partial matches) per category × algorithm. */
object T2Job { def main(args: Array[String]): Unit = Jobs.run("repro-t2")(s => Tables.t2(s)._1) }

/** Figs 6–15: throughput and memory by pattern size per category. */
object T3Job { def main(args: Array[String]): Unit = Jobs.run("repro-t3")(s => Tables.t3(s)._1) }

/** Fig 16: cost-model fit (Spearman correlations). */
object T4Job { def main(args: Array[String]): Unit = Jobs.run("repro-t4")(s => Tables.t4(s)._1) }

/** Fig 17: large-pattern plan quality and generation time (no stream needed). */
object T5Job { def main(args: Array[String]): Unit = println(Tables.t5()._1) }

/** Fig 18: throughput/latency trade-off under the hybrid cost model. */
object T6Job { def main(args: Array[String]): Unit = Jobs.run("repro-t6")(s => Tables.t6(s)._1) }

/** Fig 19: event selection strategies. */
object T7Job { def main(args: Array[String]): Unit = Jobs.run("repro-t7")(s => Tables.t7(s)._1) }
