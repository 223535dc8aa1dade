package repro.sparkexec

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{ConfigParam, ConfigSpace, ConfigValues, ExecResult, ParamKind, TuningObjective}

/** Real-Spark tuning objective: applies a configuration to the live session,
  * executes the workload's queries through Catalyst, and reports wall-clock
  * plus JVM GC seconds observed via a SparkListener.
  *
  * Only the runtime-settable `spark.sql.*` subset of Table 2 can be tuned on
  * a live local session (executor topology is fixed at session start — the
  * cluster-level parameters are exercised by the simulator instead; see
  * DESIGN.md §2). Queries are forced end-to-end with the `noop` DataSourceV2
  * sink so the full physical plan executes.
  */
final class SparkObjective(
    spark: SparkSession,
    queriesToRun: Seq[LiteQuery],
    tables: Map[String, DataFrame],
    name: String = "real-spark",
) extends TuningObjective {

  // register inputs once as temp views
  tables.foreach { case (n, df) => df.createOrReplaceTempView(n) }

  private val listener = new MetricsListener
  spark.sparkContext.addSparkListener(listener)

  override def workloadName: String = name
  override def queries: Seq[String] = queriesToRun.map(_.id)

  /** Set every tunable parameter on the session; unknown keys are skipped
    * (recorded in `skippedKeys`) so paper-era names that no longer exist in
    * Spark 4.x cannot crash a tuning run.
    */
  def applyConf(conf: ConfigValues): Unit = {
    conf.values.foreach { case (key, v) =>
      SparkObjective.settable.get(key).foreach { render =>
        try spark.conf.set(key, render(v))
        catch { case _: Exception => SparkObjective.recordSkipped(key) }
      }
    }
  }

  override def run(conf: ConfigValues, datasizeGB: Double, subset: Option[Seq[String]] = None): ExecResult = {
    applyConf(conf)
    val wanted = subset.map(_.toSet)
    val toRun = queriesToRun.filter(q => wanted.forall(_.contains(q.id)))
    var gcTotal = 0.0
    val times = toRun.map { q =>
      listener.reset()
      val t0 = System.nanoTime()
      spark.sql(q.sql).write.format("noop").mode("overwrite").save()
      val sec = (System.nanoTime() - t0) / 1e9
      gcTotal += listener.gcSeconds
      q.id -> sec
    }.toMap
    ExecResult(times, gcTotal)
  }
}

object SparkObjective {
  private val skipped = scala.collection.concurrent.TrieMap.empty[String, Boolean]
  private[sparkexec] def recordSkipped(key: String): Unit = skipped.put(key, true)
  def skippedKeys: Set[String] = skipped.keySet.toSet

  private def boolS(v: Double): String = if (v >= 0.5) "true" else "false"

  /** Runtime-settable keys and how their Table 2 numeric value renders into a
    * Spark conf string (autoBroadcastJoinThreshold is in KB in Table 2).
    */
  val settable: Map[String, Double => String] = Map(
    "spark.sql.shuffle.partitions" -> (v => math.max(1, math.round(v)).toString),
    "spark.sql.autoBroadcastJoinThreshold" -> (v => (math.round(v) * 1024L).toString),
    "spark.sql.inMemoryColumnarStorage.batchSize" -> (v => math.max(1, math.round(v)).toString),
    "spark.sql.inMemoryColumnarStorage.compressed" -> boolS _,
    "spark.sql.codegen.maxFields" -> (v => math.max(1, math.round(v)).toString),
    "spark.sql.join.preferSortMergeJoin" -> boolS _,
    "spark.sql.sort.enableRadixSort" -> boolS _,
  )

  /** Small-data tuning space for the live local session (ranges scaled to
    * SF ≤ 0.1 inputs; Table 2's 100–1000 shuffle partitions would be all
    * overhead at megabyte scale).
    */
  val runtimeSpace: ConfigSpace = ConfigSpace(Seq(
    ConfigParam("spark.sql.shuffle.partitions", 200, ParamKind.IntK, (4, 64), (4, 64)),
    ConfigParam("spark.sql.autoBroadcastJoinThreshold", 1024, ParamKind.IntK, (1, 8192), (1, 8192)),
    ConfigParam("spark.sql.inMemoryColumnarStorage.batchSize", 10000, ParamKind.IntK, (1000, 20000), (1000, 20000)),
    ConfigParam("spark.sql.inMemoryColumnarStorage.compressed", 1.0, ParamKind.BoolK, (0, 1), (0, 1)),
    ConfigParam("spark.sql.codegen.maxFields", 100, ParamKind.IntK, (50, 200), (50, 200)),
    ConfigParam("spark.sql.join.preferSortMergeJoin", 1.0, ParamKind.BoolK, (0, 1), (0, 1)),
    ConfigParam("spark.sql.sort.enableRadixSort", 1.0, ParamKind.BoolK, (0, 1), (0, 1)),
  ), useRangeA = true)
}
