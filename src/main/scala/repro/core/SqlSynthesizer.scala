package repro.core

import Ast._
import MultiEventEngine.defaultAlias
import repro.events.EventSchema

/** Synthesizes the semantically equivalent flat SQL for an AIQL query — the
  * comparator of the paper's evaluation ("the semantically equivalent SQL
  * queries executed in PostgreSQL"): all event patterns become self-joins of
  * the `events` table with every constraint woven into one WHERE clause,
  * left to the default engine schedule.
  *
  * Dialects:
  *  - [[SqlSynthesizer.Spark]]: typed `events` view, executed via
  *    `spark.sql` by [[repro.baseline.NaiveSqlBaseline]];
  *  - [[SqlSynthesizer.DuckDb]]: the [[repro.Oracle]] stores all columns as
  *    VARCHAR, so numeric columns are CAST before comparison.
  *
  * The synthesizer also counts the atomic constraints it emits, feeding the
  * conciseness comparison (T2).
  */
object SqlSynthesizer {

  sealed trait Dialect { def castNumeric: Boolean }
  case object Spark  extends Dialect { val castNumeric = false }
  case object DuckDb extends Dialect { val castNumeric = true }

  /** A synthesized query plus the number of atomic constraints in it. */
  final case class Synth(sql: String, constraints: Int)

  final case class SynthError(msg: String) extends RuntimeException(msg)

  /** Route any parsed query; anomaly SQL additionally references a
    * `wins(win, wstart, wend)` helper table (see [[windowsSpec]]).
    */
  def forQuery(q: Query, dialect: Dialect): Synth = q match {
    case m: MultiEventQuery => multiEvent(m, dialect)
    case d: DependencyQuery => multiEvent(DependencyCompiler.compile(d), dialect)
    case a: AnomalyQuery    => anomaly(a, dialect)
  }

  // ------------------------------------------------------------ multievent

  def multiEvent(q: MultiEventQuery, dialect: Dialect): Synth = {
    val preds = Seq.newBuilder[String]

    def qcol(evt: String, c: String): String =
      if (dialect.castNumeric && EventSchema.numericColumns.contains(c))
        s"CAST($evt.$c AS BIGINT)"
      else s"$evt.$c"

    // global constraints — repeated for every event table in the naive SQL
    val window = Times.window(q.globals)
    val agents = Times.agents(q.globals)
    for (e <- q.events) {
      for ((s, t) <- window) {
        preds += s"${qcol(e.alias, "ts")} >= $s"
        preds += s"${qcol(e.alias, "ts")} < $t"
      }
      for (as <- agents)
        preds += s"${qcol(e.alias, "agent_id")} IN (${as.mkString(", ")})"
    }

    // per-pattern predicates
    for (e <- q.events) {
      preds += s"${qcol(e.alias, "op")} = '${esc(e.op)}'"
      preds += s"${qcol(e.alias, "obj_type")} = '${esc(e.obj.kind)}'"
      for (f <- e.subj.filter) preds ++= filterAtoms(e.alias, e.subj, "subj", f, dialect)
      for (f <- e.obj.filter)  preds ++= filterAtoms(e.alias, e.obj, "obj", f, dialect)
      if (e.subj.name == e.obj.name)
        preds += s"${qcol(e.alias, Attrs.joinKey(e.subj.kind, "subj"))} = " +
                 s"${qcol(e.alias, Attrs.joinKey(e.obj.kind, "obj"))}"
    }

    // implicit attribute relationships: same variable across events
    val occs = scala.collection.mutable.LinkedHashMap[String, Vector[(String, String, String)]]()
    for (e <- q.events; (v, k, r) <- Ast.entityOccurrences(e))
      occs(v) = occs.getOrElse(v, Vector.empty) :+ ((e.alias, k, r))
    for ((_, os) <- occs if os.size > 1) {
      val (e0, k0, r0) = os.head
      for ((e1, k1, r1) <- os.tail if e1 != e0) {
        preds += s"${qcol(e0, Attrs.joinKey(k0, r0))} = ${qcol(e1, Attrs.joinKey(k1, r1))}"
        if (Attrs.isHostLocal(k0))
          preds += s"${qcol(e0, "agent_id")} = ${qcol(e1, "agent_id")}"
      }
    }

    // temporal relationships
    for (t <- q.temps) {
      val (early, late) = if (t.rel == "before") (t.left, t.right) else (t.right, t.left)
      preds += s"${qcol(early, "ts")} < ${qcol(late, "ts")}"
    }

    val firstOcc = occs.view.mapValues(_.head).toMap
    def leafSql(e: Expr): String = e match {
      case VarRef(v) if firstOcc.contains(v) =>
        val (evt, k, r) = firstOcc(v); qcol(evt, Attrs.entityAttr(k, r, ""))
      case AttrRef(v, a) if q.events.exists(_.alias == v) => qcol(v, Attrs.eventAttr(a))
      case AttrRef(v, a) if firstOcc.contains(v) =>
        val (evt, k, r) = firstOcc(v); qcol(evt, Attrs.entityAttr(k, r, a))
      case other => throw SynthError(s"unresolvable leaf $other")
    }

    val items = q.returns.map { r =>
      val name = r.alias.getOrElse(defaultAlias(r.expr))
      s"${exprSql(r.expr, leafSql)} AS $name"
    }
    val grouping =
      if (q.returns.exists(r => ExprEval.hasAgg(r.expr)) && q.groupBy.nonEmpty)
        s"\nGROUP BY ${q.groupBy.map(g => exprSql(g, leafSql)).mkString(", ")}"
      else ""

    val allPreds = preds.result()
    val sql =
      s"""SELECT ${items.mkString(", ")}
         |FROM ${q.events.map(e => s"events ${e.alias}").mkString(", ")}
         |WHERE ${allPreds.mkString("\n  AND ")}$grouping""".stripMargin
    Synth(sql, allPreds.size)
  }

  // --------------------------------------------------------------- anomaly

  /** Window helper rows for an anomaly query: (win, wstart, wend). The
    * baseline registers them as view `wins`; the oracle passes them as an
    * input table — window assignment itself is plain SQL range predicates.
    */
  def windowsSpec(q: AnomalyQuery): Seq[(Long, Long, Long)] = {
    val (t0, t1) = Times.window(q.globals).getOrElse(
      throw SynthError("anomaly query requires a global time window"))
    val nWin = ((t1 - t0 + q.stepMs - 1) / q.stepMs).toInt
    (0 until nWin).map(w => (w.toLong, t0 + w * q.stepMs, t0 + w * q.stepMs + q.windowMs))
  }

  def anomaly(q: AnomalyQuery, dialect: Dialect): Synth = {
    val preds = Seq.newBuilder[String]
    def qcol(tbl: String, c: String): String =
      if (dialect.castNumeric &&
          (EventSchema.numericColumns.contains(c) || tbl == "w"))
        s"CAST($tbl.$c AS BIGINT)"
      else s"$tbl.$c"

    val window = Times.window(q.globals)
    for ((s, t) <- window) {
      preds += s"${qcol("e", "ts")} >= $s"
      preds += s"${qcol("e", "ts")} < $t"
    }
    for (as <- Times.agents(q.globals))
      preds += s"${qcol("e", "agent_id")} IN (${as.mkString(", ")})"

    preds += s"${qcol("e", "op")} = '${esc(q.event.op)}'"
    preds += s"${qcol("e", "obj_type")} = '${esc(q.event.obj.kind)}'"
    for (f <- q.event.subj.filter) preds ++= filterAtomsOn("e", q.event.subj, "subj", f, dialect)
    for (f <- q.event.obj.filter)  preds ++= filterAtomsOn("e", q.event.obj, "obj", f, dialect)

    // window containment
    preds += s"${qcol("e", "ts")} >= ${qcol("w", "wstart")}"
    preds += s"${qcol("e", "ts")} < ${qcol("w", "wend")}"

    val roles = PatternCompiler.roles(q.event)
    def leafSql(e: Expr): String = e match {
      case VarRef(v) if roles.contains(v) =>
        val (k, r) = roles(v); qcol("e", Attrs.entityAttr(k, r, ""))
      case AttrRef(v, a) if v == q.event.alias => qcol("e", Attrs.eventAttr(a))
      case AttrRef(v, a) if roles.contains(v) =>
        val (k, r) = roles(v); qcol("e", Attrs.entityAttr(k, r, a))
      case other => throw SynthError(s"unresolvable leaf $other")
    }

    def keyName(g: Expr): String =
      q.returns.find(_.expr == g).flatMap(_.alias).getOrElse(defaultAlias(g))
    val keySqls = q.groupBy.map(g => s"${exprSql(g, leafSql)} AS ${keyName(g)}")
    val aggItems = q.returns.collect {
      case ReturnItem(e, al) if ExprEval.hasAgg(e) => (al.getOrElse(defaultAlias(e)), e)
    }
    val aggSqls = aggItems.map { case (name, e) => s"${exprSql(e, leafSql)} AS $name" }

    val allPreds = preds.result()
    val aggCte =
      s"""SELECT ${(s"${qcol("w", "win")} AS win" +: keySqls ++: aggSqls).mkString(", ")}
         |  FROM events e, wins w
         |  WHERE ${allPreds.mkString("\n    AND ")}
         |  GROUP BY ${(qcol("w", "win") +: q.groupBy.map(g => exprSql(g, leafSql))).mkString(", ")}""".stripMargin

    val keyNames = q.groupBy.map(keyName)
    val hists = q.having.toSeq.flatMap(collectHists).distinct
    var havingConstraints = 0
    val joins = hists.map { case (alias, k) =>
      havingConstraints += 1 + keyNames.size
      val on = (s"a${k}_$alias.win = a0.win - $k" +:
                keyNames.map(kn => s"a${k}_$alias.$kn = a0.$kn")).mkString(" AND ")
      s"LEFT JOIN agg a${k}_$alias ON $on"
    }

    def havingLeaf(e: Expr): String = e match {
      case VarRef(v) if aggItems.exists(_._1 == v) => s"a0.$v"
      case VarRef(v) if keyNames.contains(v)       => s"a0.$v"
      case HistRef(a, k)                           => s"a${k}_$a.$a"
      case other => throw SynthError(s"unresolvable having leaf $other")
    }
    val where = q.having match {
      case None    => ""
      case Some(h) => havingConstraints += countAtoms(h); s"\nWHERE ${exprSql(h, havingLeaf)}"
    }

    val outer = ("a0.win AS win" +: q.returns.map { r =>
      val name =
        if (ExprEval.hasAgg(r.expr)) r.alias.getOrElse(defaultAlias(r.expr))
        else keyName(q.groupBy.find(_ == r.expr).getOrElse(
          throw SynthError(s"return item ${r.expr} is neither aggregated nor grouped")))
      s"a0.$name AS $name"
    }).mkString(", ")

    val sql =
      s"""WITH agg AS (
         |$aggCte
         |)
         |SELECT $outer
         |FROM agg a0
         |${joins.mkString("\n")}$where""".stripMargin
    Synth(sql, allPreds.size + havingConstraints)
  }

  // --------------------------------------------------------------- shared

  private def collectHists(e: Expr): Seq[(String, Int)] = e match {
    case HistRef(a, k) => Seq((a, k))
    case Bin(_, l, r)  => collectHists(l) ++ collectHists(r)
    case Not(x)        => collectHists(x)
    case Agg(_, a)     => collectHists(a)
    case _             => Seq.empty
  }

  /** Count of atomic comparisons in an expression. */
  def countAtoms(e: Expr): Int = e match {
    case Bin(op, l, r) if Set("&&", "||").contains(op) => countAtoms(l) + countAtoms(r)
    case Bin(_, _, _) => 1
    case Not(x)       => countAtoms(x)
    case _            => 0
  }

  /** Entity filter → SQL atoms over the event table aliased `evtAlias`. */
  private def filterAtoms(evtAlias: String, ent: EntityPat, role: String,
                          f: Expr, dialect: Dialect): Seq[String] =
    filterAtomsOn(evtAlias, ent, role, f, dialect)

  private def filterAtomsOn(tbl: String, ent: EntityPat, role: String,
                            f: Expr, dialect: Dialect): Seq[String] = {
    def leaf(e: Expr): String = e match {
      case AttrRef(v, a) if v == ent.name =>
        val c = Attrs.entityAttr(ent.kind, role, a)
        if (dialect.castNumeric && EventSchema.numericColumns.contains(c))
          s"CAST($tbl.$c AS BIGINT)"
        else s"$tbl.$c"
      case other => throw SynthError(s"unsupported filter leaf $other")
    }
    // top-level conjunctions become separate atoms (matching WHERE style)
    def split(e: Expr): Seq[String] = e match {
      case Bin("&&", l, r) => split(l) ++ split(r)
      case other           => Seq(exprSql(other, leaf))
    }
    split(f)
  }

  /** Generic expression printer with LIKE translation for `%` patterns. */
  def exprSql(e: Expr, leaf: Expr => String): String = e match {
    case NumLit(t) => t
    case StrLit(s) => s"'${esc(s)}'"
    case Bin("=", l, StrLit(s)) if s.contains("%") => s"${exprSql(l, leaf)} LIKE '${esc(s)}'"
    case Bin("!=", l, StrLit(s)) if s.contains("%") => s"${exprSql(l, leaf)} NOT LIKE '${esc(s)}'"
    case Bin("=", l, r)  => s"${exprSql(l, leaf)} = ${exprSql(r, leaf)}"
    case Bin("!=", l, r) => s"${exprSql(l, leaf)} <> ${exprSql(r, leaf)}"
    case Bin(op, l, r) if Set("&&", "||").contains(op) =>
      val o = if (op == "&&") "AND" else "OR"
      s"(${exprSql(l, leaf)} $o ${exprSql(r, leaf)})"
    case Bin(op, l, r) if Set("+", "-", "*", "/").contains(op) =>
      s"(${exprSql(l, leaf)} $op ${exprSql(r, leaf)})"
    case Bin(op, l, r) => s"${exprSql(l, leaf)} $op ${exprSql(r, leaf)}"
    case Not(x)        => s"NOT (${exprSql(x, leaf)})"
    case Agg("count", VarRef(_)) => "COUNT(*)"
    case Agg(f, arg)   => s"${f.toUpperCase}(${exprSql(arg, leaf)})"
    case other         => leaf(other)
  }

  private def esc(s: String): String = s.replace("'", "''")
}
