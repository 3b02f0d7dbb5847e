package repro.core

import repro.{SparkSpec, TestUtil}
import repro.baseline.NaiveSqlBaseline
import Ast._
import MultiEventEngine.SemanticError

class MultiEventEngineSpec extends SparkSpec with EngineFixture {

  private val at = "(at \"08/01/2023\")"

  test("single pattern with subject filter") {
    val df = run(s"""$at
                    |proc p["%osql.exe"] write file f as evt
                    |return p, f, evt.ts""".stripMargin)
    assert(df.columns.toSeq == Seq("p", "f", "evt_ts"))
    val rows = df.collect().map(r => (r.getString(0), r.getString(1))).toSet
    assert(rows == Set(("osql.exe", "/d/backup.dmp"), ("osql.exe", "/d/other.dmp")))
  }

  test("global agent constraint restricts the scan") {
    val df = run(s"""$at
                    |agentid = 2
                    |proc p["%osql.exe"] write file f as evt
                    |return p, f""".stripMargin)
    assert(df.count() == 1)
  }

  test("time window excludes events outside it") {
    val df = run("""(from "08/01/2023 00:00:01" to "08/01/2023 00:00:03")
                   |proc p write file f as evt
                   |return p, f, evt.ts""".stripMargin)
    // only ts 1000..2999 qualify: events 2 (t=2000) and 6 (t=2500)
    assert(df.count() == 2)
  }

  test("implicit attribute relationship joins the same file variable") {
    val df = run(s"""$at
                    |proc p1["%osql.exe"] write file f as evt1
                    |proc p2["%sbblv.exe"] read file f as evt2
                    |return p1, p2, f""".stripMargin)
    val rows = df.collect().map(r => (r.getString(0), r.getString(1), r.getString(2))).toSet
    assert(rows == Set(("osql.exe", "sbblv.exe", "/d/backup.dmp")))
  }

  test("process variable joins object-of-start to subject-of-write") {
    val df = run(s"""$at
                    |agentid = 1
                    |proc p1["%cmd.exe"] start proc p2 as evt1
                    |proc p2 write file f as evt2
                    |return p1, p2, f""".stripMargin)
    val rows = df.collect().map(r => (r.getString(1), r.getString(2))).toSet
    assert(rows == Set(("osql.exe", "/d/backup.dmp"), ("osql.exe", "/d/other.dmp")))
  }

  test("host-local entities force agent equality") {
    // without agent equality the agent-2 osql write (same pid 20) would join
    // the agent-1 start event
    val df = run(s"""$at
                    |proc p1["%cmd.exe"] start proc p2 as evt1
                    |proc p2 write file f["%backup.dmp"] as evt2
                    |with evt1 before evt2
                    |return evt1.agentid, p2, f""".stripMargin)
    val agents = df.collect().map(_.getInt(0)).toSet
    assert(agents == Set(1)) // agent-2 chain violates the temporal order
  }

  test("temporal relation filters out wrong-order matches") {
    val without = run(s"""$at
                         |proc p1["%cmd.exe"] start proc p2 as evt1
                         |proc p2 write file f["%backup.dmp"] as evt2
                         |return evt1.agentid, p2""".stripMargin)
    assert(without.collect().map(_.getInt(0)).toSet == Set(1, 2))
    val withRel = run(s"""$at
                         |proc p1["%cmd.exe"] start proc p2 as evt1
                         |proc p2 write file f["%backup.dmp"] as evt2
                         |with evt1 before evt2
                         |return evt1.agentid, p2""".stripMargin)
    assert(withRel.collect().map(_.getInt(0)).toSet == Set(1))
  }

  test("'after' is the mirror of before") {
    val df = run(s"""$at
                    |proc p1["%cmd.exe"] start proc p2 as evt1
                    |proc p2 write file f["%backup.dmp"] as evt2
                    |with evt2 after evt1
                    |return evt1.agentid""".stripMargin)
    assert(df.collect().map(_.getInt(0)).toSet == Set(1))
  }

  test("ip entities join across hosts (no agent equality)") {
    val df = run(s"""$at
                    |proc p1["%sbblv.exe"] write ip i as evt1
                    |proc p2["%bash%"] connect ip i as evt2
                    |return p1, p2, i, evt1.agentid, evt2.agentid""".stripMargin)
    val rows = df.collect()
    assert(rows.length == 1)
    assert(rows(0).getString(2) == "9.9.9.9")
    assert(rows(0).getInt(3) == 1 && rows(0).getInt(4) == 2)
  }

  test("four-event chain (paper Query 1 shape) finds exactly the attack") {
    val df = run(s"""$at
                    |proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
                    |proc p2 write file f1["%backup.dmp"] as evt2
                    |proc p3["%sbblv.exe"] read file f1 as evt3
                    |proc p3 write ip i1[dst_ip = "9.9.9.9"] as evt4
                    |with evt1 before evt2, evt2 before evt3, evt3 before evt4
                    |return p1, p2, f1, p3, i1""".stripMargin)
    val rows = df.collect()
    assert(rows.length == 1)
    assert(rows(0).toSeq == Seq("cmd.exe", "osql.exe", "/d/backup.dmp", "sbblv.exe", "9.9.9.9"))
  }

  test("unrelated patterns produce a cross product") {
    val df = run(s"""$at
                    |proc p1["%calc%"] start proc p2 as evt1
                    |proc p3["%bash%"] connect ip i as evt2
                    |return p1, p3""".stripMargin)
    // "%calc%" matches nothing as subject — empty × 1 = empty
    assert(df.count() == 0)
    val df2 = run(s"""$at
                     |proc p1 start proc p2["%calc%"] as evt1
                     |proc p3["%bash%"] connect ip i as evt2
                     |return p1, p3""".stripMargin)
    assert(df2.count() == 1) // 1 start-calc × 1 connect
  }

  test("syntax shortcuts: bare variables resolve to default attributes") {
    val df = run(s"""$at
                    |proc p["%sbblv.exe"] write ip i as evt
                    |return p, i, i.dst_port, p.pid""".stripMargin)
    assert(df.columns.toSeq == Seq("p", "i", "i_dst_port", "p_pid"))
    val r = df.collect()(0)
    assert(r.toSeq == Seq("sbblv.exe", "9.9.9.9", 443, 30L))
  }

  test("explicit return aliases are used") {
    val df = run(s"""$at
                    |proc p["%sbblv.exe"] write ip i as evt
                    |return p as malware, evt.amount as bytes""".stripMargin)
    assert(df.columns.toSeq == Seq("malware", "bytes"))
  }

  test("aggregation with group by") {
    val df = run(s"""$at
                    |proc p write ip i[dst_ip = "9.9.9.9"] as evt
                    |return p, count(evt) as n, sum(evt.amount) as total
                    |group by p""".stripMargin)
    val rows = df.collect().map(r => (r.getString(0), r.getLong(1), r.getLong(2))).toSet
    assert(rows == Set(("sbblv.exe", 1L, 500L), ("powershell.exe", 1L, 10L)))
  }

  test("same variable as subject and object of one pattern") {
    val df = run(s"""$at
                    |proc p start proc p as evt
                    |return p""".stripMargin)
    assert(df.count() == 0) // no self-start in the fixture
  }

  // ---------------------------------------------------------- validation

  test("duplicate event alias is rejected") {
    assertThrows[SemanticError](run(
      s"""proc p read file f as evt
         |proc q write file f as evt
         |return p""".stripMargin))
  }

  test("kind-inconsistent variable is rejected") {
    assertThrows[SemanticError](run(
      s"""proc p read file f as evt1
         |proc f read file g as evt2
         |return p""".stripMargin))
  }

  test("temporal relation on undeclared alias is rejected") {
    assertThrows[SemanticError](run(
      s"""proc p read file f as evt1
         |with evt1 before evt9
         |return p""".stripMargin))
  }

  test("bare event alias in return is rejected") {
    assertThrows[SemanticError](run(
      s"""proc p read file f as evt
         |return evt""".stripMargin))
  }

  test("non-proc subject is rejected at compile") {
    assertThrows[PatternCompiler.CompileError](run(
      s"""file f read file g as evt
         |return f""".stripMargin))
  }

  test("aggregate without group by over plain items is rejected") {
    assertThrows[SemanticError](run(
      s"""proc p write ip i as evt
         |return p, count(evt) as n""".stripMargin))
  }

  // ------------------------------------------------- optimization configs

  private val configs = Seq(
    "full" -> AiqlConf(),
    "declared-order" -> AiqlConf(selectivityOrdering = false),
    "heuristic-selectivity" -> AiqlConf(exactSelectivity = false),
    "no-pushdown" -> AiqlConf(timeBoundPushdown = false),
    "no-parallel" -> AiqlConf(spatialParallelism = false),
    "all-off" -> AiqlConf(selectivityOrdering = false, exactSelectivity = false,
                          timeBoundPushdown = false, spatialParallelism = false),
  )

  private val crossCheckQueries = Seq(
    s"""$at
       |proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
       |proc p2 write file f1["%backup.dmp"] as evt2
       |proc p3["%sbblv.exe"] read file f1 as evt3
       |proc p3 write ip i1[dst_ip = "9.9.9.9"] as evt4
       |with evt1 before evt2, evt2 before evt3, evt3 before evt4
       |return p1, p2, f1, p3, i1""".stripMargin,
    s"""$at
       |agentid in (1, 2)
       |proc p1["%cmd.exe"] start proc p2 as evt1
       |proc p2 write file f as evt2
       |with evt1 before evt2
       |return p1, p2, f, evt1.ts, evt2.ts""".stripMargin,
    s"""$at
       |proc p1 write ip i as evt1
       |proc p2 connect ip i as evt2
       |return p1, p2, i""".stripMargin,
  )

  for ((name, conf) <- configs; (q, k) <- crossCheckQueries.zipWithIndex) {
    test(s"optimizations preserve semantics: $name / query $k") {
      TestUtil.assertSameRows(run(q), run(q, conf), s"$name q$k")
    }
  }

  // ------------------------------------------------------ baseline parity

  for ((q, k) <- crossCheckQueries.zipWithIndex) {
    test(s"engine matches naive SQL baseline on fixture query $k") {
      val baseline = new NaiveSqlBaseline(spark, fixtureDf)
      TestUtil.assertSameRows(run(q), baseline.execute(q), s"baseline q$k")
    }
  }

  // -------------------------------------------------- spatial partitioning

  private def multi(src: String) = Parser.parse(src).asInstanceOf[MultiEventQuery]

  test("host-local-linked query is spatially partitionable") {
    val q = multi(
      """proc p1 start proc p2 as evt1
        |proc p2 write file f as evt2
        |return p1""".stripMargin)
    assert(engine().spatiallyPartitionable(q))
  }

  test("ip-linked query is not spatially partitionable") {
    val q = multi(
      """proc p1 write ip i as evt1
        |proc p2 connect ip i as evt2
        |return p1""".stripMargin)
    assert(!engine().spatiallyPartitionable(q))
  }

  test("disconnected query is not spatially partitionable") {
    val q = multi(
      """proc p1 write file f as evt1
        |proc p2 write file g as evt2
        |return p1""".stripMargin)
    assert(!engine().spatiallyPartitionable(q))
  }

  test("single-event query is spatially partitionable") {
    val q = multi("proc p write file f as evt\nreturn p")
    assert(engine().spatiallyPartitionable(q))
  }

  test("parallel execution equals single execution on a multi-agent query") {
    val q = s"""$at
               |agentid in (1, 2)
               |proc p1["%cmd.exe"] start proc p2 as evt1
               |proc p2 write file f as evt2
               |return p1, p2, f, evt2.agentid""".stripMargin
    TestUtil.assertSameRows(
      run(q, AiqlConf(spatialParallelism = true)),
      run(q, AiqlConf(spatialParallelism = false)),
      "parallel-vs-single")
  }
}
