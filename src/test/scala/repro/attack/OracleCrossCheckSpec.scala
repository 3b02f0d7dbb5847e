package repro.attack

import org.apache.spark.sql.DataFrame

import repro.{Oracle, SparkSpec}
import repro.core._

/** Independent correctness oracle: the optimized engine's results are
  * diffed against DuckDB executing the synthesized (DuckDb-dialect)
  * equivalent SQL over the same rows — a wrong join condition, broken
  * temporal scheduling, or bad window math fails here even if both Spark
  * paths agreed with each other.
  *
  * Kept at a tiny scale factor: the oracle ships every row over JDBC.
  */
class OracleCrossCheckSpec extends SparkSpec {

  private lazy val events: DataFrame = {
    val df = AttackDataGen.events(spark, sf = 0.0005, seed = 13).cache()
    df.count()
    df
  }
  private lazy val aiql = new Aiql(spark, InMemory(events))

  // q18 is excluded: DuckDB returns SUM(BIGINT) as HUGEINT/decimal, which
  // canonicalizes differently from Spark's long — covered by baseline parity.
  private val oracleQueries = Seq("q01", "q02", "q04", "q06", "q08", "q10", "q11", "q15", "q19")

  for (name <- oracleQueries) {
    test(s"$name: engine output equals DuckDB on the equivalent SQL") {
      val q = InvestigationQueries.byName(name)
      val parsed = Parser.parse(q.aiql)
      val sql = SqlSynthesizer.forQuery(parsed, SqlSynthesizer.DuckDb).sql
      Oracle.assertEquivalent(aiql.query(q.aiql), sql, "events" -> events)
    }
  }

  test("q20 (anomaly): engine output equals DuckDB on the equivalent SQL") {
    val q = InvestigationQueries.anomaly
    val parsed = Parser.parse(q.aiql).asInstanceOf[Ast.AnomalyQuery]
    val sql = SqlSynthesizer.anomaly(parsed, SqlSynthesizer.DuckDb).sql
    import spark.implicits._
    val wins = SqlSynthesizer.windowsSpec(parsed).toDF("win", "wstart", "wend")
    Oracle.assertEquivalent(aiql.query(q.aiql), sql, "events" -> events, "wins" -> wins)
  }
}
