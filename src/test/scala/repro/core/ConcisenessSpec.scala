package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.attack.InvestigationQueries

class ConcisenessSpec extends AnyFunSuite {

  test("word count splits on whitespace") {
    assert(Conciseness.words("return p1, p2") == 3)
    assert(Conciseness.words("  a \n b\tc ") == 3)
    assert(Conciseness.words("") == 0)
  }

  test("char count excludes whitespace") {
    assert(Conciseness.chars("a b\nc") == 3)
    assert(Conciseness.chars("return p") == 7)
  }

  test("AIQL constraint count: multievent") {
    val q = Parser.parse(
      """(at "08/01/2023")
        |agentid = 4
        |proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
        |proc p2 write file f["%backup%"] as evt2
        |with evt1 before evt2
        |return p1""".stripMargin)
    // 2 globals + 3 filter atoms + 1 temporal
    assert(Conciseness.aiqlConstraints(q) == 6)
  }

  test("AIQL constraint count: anomaly counts window spec and having") {
    val q = Parser.parse(
      """(at "08/01/2023")
        |agentid = 4
        |window = 1 min, step = 10 sec
        |proc p write ip i[dst_ip = "1.2.3.4"] as evt
        |return p, avg(evt.amount) as amt
        |group by p
        |having amt > 2 * (amt + amt[1] + amt[2]) / 3""".stripMargin)
    // 2 globals + 1 filter + 2 window spec + 1 having atom
    assert(Conciseness.aiqlConstraints(q) == 6)
  }

  test("AIQL constraint count: dependency direction counts once") {
    val q = Parser.parse(
      """forward
        |proc p1 read file f["%x%"] as evt1
        |proc p1 connect ip i as evt2
        |proc p2 connect ip i as evt3
        |return p1""".stripMargin)
    // 1 filter + 1 direction keyword
    assert(Conciseness.aiqlConstraints(q) == 2)
  }

  test("comments do not inflate AIQL metrics") {
    val bare = "proc p read file f as evt\nreturn p"
    val commented = "proc p read file f as evt // note\nreturn p // done"
    val q = Parser.parse(bare)
    assert(Conciseness.ofAiql(commented, q) == Conciseness.ofAiql(bare, q))
  }

  test("every investigation query: SQL needs more constraints, words, chars") {
    for (iq <- InvestigationQueries.all) {
      val q = Parser.parse(iq.aiql)
      val aiql = Conciseness.ofAiql(iq.aiql, q)
      val sql = Conciseness.ofSql(SqlSynthesizer.forQuery(q, SqlSynthesizer.Spark))
      assert(sql.constraints > aiql.constraints, s"${iq.name} constraints")
      assert(sql.words > aiql.words, s"${iq.name} words")
      assert(sql.chars > aiql.chars, s"${iq.name} chars")
    }
  }

  test("aggregate ratios are in the paper's regime (≥2x constraints)") {
    val (ac, sc) = InvestigationQueries.all.map { iq =>
      val q = Parser.parse(iq.aiql)
      (Conciseness.ofAiql(iq.aiql, q).constraints,
       Conciseness.ofSql(SqlSynthesizer.forQuery(q, SqlSynthesizer.Spark)).constraints)
    }.unzip
    assert(sc.sum.toDouble / ac.sum >= 2.0)
  }
}
