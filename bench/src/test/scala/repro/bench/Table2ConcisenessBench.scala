package repro.bench

import repro.SparkSpec
import repro.attack.InvestigationQueries
import repro.core._

/** T2 — query conciseness, AIQL vs the semantically equivalent SQL (paper:
  * "SQL queries contain at least 3.0x more constraints, 3.5x more words,
  * and 5.2x more characters (excluding spaces) than AIQL queries").
  */
class Table2ConcisenessBench extends SparkSpec {

  test("Table 2: constraints / words / chars, AIQL vs equivalent SQL") {
    println("=== Table 2 (query conciseness) ===")
    println(f"${"query"}%-6s${"aiql_c"}%8s${"sql_c"}%8s${"aiql_w"}%8s${"sql_w"}%8s${"aiql_ch"}%9s${"sql_ch"}%9s")
    var ac = 0; var sc = 0; var aw = 0; var sw = 0; var ah = 0; var sh = 0
    var minC = Double.MaxValue
    for (q <- InvestigationQueries.all) {
      val parsed = Parser.parse(q.aiql)
      val a = Conciseness.ofAiql(q.aiql, parsed)
      val s = Conciseness.ofSql(SqlSynthesizer.forQuery(parsed, SqlSynthesizer.Spark))
      ac += a.constraints; sc += s.constraints
      aw += a.words; sw += s.words
      ah += a.chars; sh += s.chars
      minC = math.min(minC, s.constraints.toDouble / a.constraints)
      println(f"${q.name}%-6s${a.constraints}%8d${s.constraints}%8d${a.words}%8d${s.words}%8d${a.chars}%9d${s.chars}%9d")
    }
    val (rc, rw, rh) = (sc.toDouble / ac, sw.toDouble / aw, sh.toDouble / ah)
    println(f"${"total"}%-6s$ac%8d$sc%8d$aw%8d$sw%8d$ah%9d$sh%9d")
    println(f"[paper] SQL vs AIQL: >=3.0x constraints, 3.5x words, 5.2x chars")
    println(f"[ours]  SQL vs AIQL: $rc%.1fx constraints (min $minC%.1fx), $rw%.1fx words, $rh%.1fx chars")
    assert(rc >= 2.0, f"constraint ratio $rc%.2f below the paper's regime")
    assert(rw >= 2.0, f"word ratio $rw%.2f below the paper's regime")
    assert(rh >= 3.0, f"char ratio $rh%.2f below the paper's regime")
  }
}
