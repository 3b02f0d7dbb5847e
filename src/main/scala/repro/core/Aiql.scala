package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

import Ast._

/** Facade of the AIQL system (Figure 1): parse an AIQL query, route it to
  * the right engine, and return the matched results as a DataFrame.
  */
final class Aiql(
    spark: SparkSession,
    source: EventSource,
    conf: AiqlConf = AiqlConf(),
) {

  private val multi = new MultiEventEngine(spark, source, conf)
  private val anomaly = new AnomalyEngine(spark, source, conf)

  /** Parse + execute an AIQL query text. */
  def query(text: String): DataFrame = execute(Parser.parse(text))

  /** Execute an already-parsed query. */
  def execute(q: Query): DataFrame = q match {
    case m: MultiEventQuery => multi.execute(m)
    case d: DependencyQuery => multi.execute(DependencyCompiler.compile(d))
    case a: AnomalyQuery    => anomaly.execute(a)
  }

  /** Release the engines' hot-partition caches. */
  def close(): Unit = { multi.close(); anomaly.close() }
}
