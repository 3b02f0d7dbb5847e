package repro.events

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._

/** Domain-specific storage for system monitoring data.
  *
  * The paper stores events in relational DBs tuned with deduplication, batch
  * commit, and **time + space partitioning** (plus hypertables); here the
  * equivalent substrate is Parquet on the local filesystem, materialized in
  * both partition dimensions:
  *
  *  - `by_agent_day/agent_id=A/day=D/` — the primary layout; a host-scoped
  *    investigation query prunes to exactly its (agent, day) directories;
  *  - `by_day/day=D/` — a coalesced per-day copy (few large files) for
  *    cross-host queries, which would otherwise open one small file per
  *    host.
  *
  * Global constraints of an AIQL query (`agentid = …`, `(at "…")`) prune
  * whole directories at file-listing time — one of the engine's
  * domain-specific advantages over the "one flat table" execution model of
  * the SQL comparator.
  */
object EventStore {

  private def byAgentDay(path: String) = s"$path/by_agent_day"
  private def byDay(path: String) = s"$path/by_day"

  /** Write `events` (conforming to [[EventSchema.schema]]) as a partitioned
    * store at `path`, in both layouts. Exact duplicate interactions (same
    * [[EventSchema.dedupKey]]) are collapsed to one row, keeping the
    * smallest `event_id`.
    */
  def write(events: DataFrame, path: String): Unit = {
    val deduped = dedup(events).cache()
    try {
      // repartition on the layout keys so each leaf directory holds one
      // file, not one per shuffle partition
      deduped.repartition(col("agent_id"), col("day")).write
        .mode("overwrite")
        .partitionBy("agent_id", "day")
        .parquet(byAgentDay(path))
      deduped.repartition(col("day")).write
        .mode("overwrite")
        .partitionBy("day")
        .parquet(byDay(path))
    } finally deduped.unpersist()
  }

  /** Ingestion-time deduplication: one row per logical interaction key. */
  def dedup(events: DataFrame): DataFrame = {
    val others = events.columns.filterNot(EventSchema.dedupKey.contains)
    val aggs = others.map(c => min(col(c)).as(c))
    events
      .groupBy(EventSchema.dedupKey.map(col): _*)
      .agg(aggs.head, aggs.tail: _*)
      .select(events.columns.map(col): _*)
  }

  /** Read the full store (via the coarse per-day layout — fewest files). */
  def read(spark: SparkSession, path: String): DataFrame =
    spark.read.schema(EventSchema.schema).parquet(byDay(path))
      .select(EventSchema.columns.map(col): _*)

  /** Read with spatial/temporal partition pruning: only the directories for
    * the requested agents/days are listed and scanned — pruning happens at
    * file-listing time (the store-layout optimization), not merely as a
    * pushed filter. Agent-bound reads use the fine `by_agent_day` layout;
    * day-only reads use the coalesced `by_day` layout.
    */
  def readPruned(spark: SparkSession, path: String,
                 agents: Option[Seq[Int]], days: Option[Seq[String]]): DataFrame =
    (agents, days) match {
      case (None, None) => read(spark, path)
      case (Some(_), _) =>
        val agentDirs = subdirs(byAgentDay(path), "agent_id=").filter { d =>
          val v = d.getFileName.toString.stripPrefix("agent_id=").toInt
          agents.forall(_.contains(v))
        }
        val leafDirs = agentDirs.flatMap(d => subdirs(d.toString, "day=")).filter { d =>
          val v = d.getFileName.toString.stripPrefix("day=")
          days.forall(_.contains(v))
        }
        readDirs(spark, byAgentDay(path), leafDirs)
      case (None, Some(_)) =>
        val dayDirs = subdirs(byDay(path), "day=").filter { d =>
          val v = d.getFileName.toString.stripPrefix("day=")
          days.forall(_.contains(v))
        }
        readDirs(spark, byDay(path), dayDirs)
    }

  private def subdirs(path: String, prefix: String): Seq[java.nio.file.Path] = {
    import scala.jdk.CollectionConverters._
    val p = java.nio.file.Paths.get(path)
    if (!java.nio.file.Files.isDirectory(p)) Seq.empty
    else java.nio.file.Files.list(p).iterator.asScala
      .filter(d => java.nio.file.Files.isDirectory(d) &&
                   d.getFileName.toString.startsWith(prefix))
      .toSeq
  }

  private def readDirs(spark: SparkSession, basePath: String,
                       dirs: Seq[java.nio.file.Path]): DataFrame =
    if (dirs.isEmpty)
      spark.createDataFrame(spark.sparkContext.emptyRDD[Row], EventSchema.schema)
    else
      spark.read
        .option("basePath", basePath)
        .schema(EventSchema.schema)
        .parquet(dirs.map(_.toString): _*)
        .select(EventSchema.columns.map(col): _*)

  /** A deliberately *unpartitioned* copy of the store, as the flat relational
    * table the SQL comparator queries (no domain partition layout).
    */
  def writeFlat(events: DataFrame, path: String): Unit =
    dedup(events).write.mode("overwrite").parquet(path)

  def readFlat(spark: SparkSession, path: String): DataFrame =
    spark.read.schema(EventSchema.schema).parquet(path)
      .select(EventSchema.columns.map(col): _*)
}
