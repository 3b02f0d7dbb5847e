package repro.bench

import java.nio.file.Files

import repro.SparkSpec
import repro.attack.{AttackDataGen, InvestigationQueries}
import repro.core._
import repro.events.EventStore

/** T3 (supplemental) — ablation of the engine's domain-specific
  * optimizations (§2.3): pruning-power scheduling, dynamic time-bound
  * tightening, partition pruning, spatial parallelism. The paper claims
  * these as the source of its speedup; this bench isolates each.
  */
class Table3AblationBench extends SparkSpec {

  private val sf = sys.env.getOrElse("REPRO_SF", "2.0").toDouble

  private val configs: Seq[(String, AiqlConf)] = Seq(
    "full" -> AiqlConf(),
    "-selectivity" -> AiqlConf(selectivityOrdering = false),
    "-exactstats" -> AiqlConf(exactSelectivity = false),
    "-pushdown" -> AiqlConf(timeBoundPushdown = false),
    "-pruning" -> AiqlConf(partitionPruning = false),
    "-parallel" -> AiqlConf(spatialParallelism = false),
    "-broadcast" -> AiqlConf(broadcastThreshold = -1),
    "none" -> AiqlConf(selectivityOrdering = false, exactSelectivity = false,
                       timeBoundPushdown = false, partitionPruning = false,
                       spatialParallelism = false, broadcastThreshold = -1),
  )

  private val queries = Seq("q04", "q08", "q16", "q19")

  private def timed[A](f: => A): (A, Long) = {
    val t0 = System.nanoTime(); val a = f; (a, (System.nanoTime() - t0) / 1000000)
  }

  test("Table 3: per-optimization ablation on representative queries") {
    val dir = Files.createTempDirectory("aiql-t3").toString
    EventStore.write(AttackDataGen.events(spark, sf), s"$dir/store")
    val full = new Aiql(spark, StorePath(s"$dir/store"))
    val expected = queries.map(n => n -> full.query(InvestigationQueries.byName(n).aiql).count()).toMap

    println(s"=== Table 3 (engine ablation, sf=$sf) ===")
    println(f"${"config"}%-14s${queries.map(q => f"$q%10s").mkString}${"total_ms"}%10s")
    for ((name, conf) <- configs) {
      val aiql = new Aiql(spark, StorePath(s"$dir/store"), conf)
      // warm-up
      aiql.query(InvestigationQueries.byName(queries.head).aiql).collect()
      var total = 0L
      val cells = queries.map { qn =>
        val (rows, ms) = timed(aiql.query(InvestigationQueries.byName(qn).aiql).collect())
        assert(rows.length.toLong == expected(qn), s"$name/$qn changed results")
        total += ms
        f"$ms%10d"
      }
      println(f"$name%-14s${cells.mkString}$total%10d")
      aiql.close() // drop this config's hot-partition cache before the next arm
    }
    full.close()
  }
}
