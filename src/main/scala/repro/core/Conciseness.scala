package repro.core

import Ast._

/** Query-conciseness metrics for the T2 comparison: the paper reports that
  * the equivalent SQL contains "at least 3.0x more constraints, 3.5x more
  * words, and 5.2x more characters (excluding spaces)" than AIQL.
  *
  * Constraints for AIQL are counted on the AST (global clauses, filter
  * comparison atoms, temporal relations, window spec, having atoms);
  * constraints for SQL come from [[SqlSynthesizer.Synth.constraints]] (atoms
  * actually emitted into WHERE/ON).
  */
object Conciseness {

  final case class Metrics(constraints: Int, words: Int, chars: Int)

  def words(text: String): Int = text.split("\\s+").count(_.nonEmpty)

  /** Characters excluding whitespace (the paper's "excluding spaces"). */
  def chars(text: String): Int = text.count(!_.isWhitespace)

  def ofSql(s: SqlSynthesizer.Synth): Metrics =
    Metrics(s.constraints, words(s.sql), chars(s.sql))

  def ofAiql(text: String, q: Query): Metrics =
    Metrics(aiqlConstraints(q), words(stripComments(text)), chars(stripComments(text)))

  private def stripComments(text: String): String =
    text.linesIterator.map(_.split("//")(0)).mkString("\n")

  /** Atomic constraints a user actually writes in the AIQL query. */
  def aiqlConstraints(q: Query): Int = q match {
    case m: MultiEventQuery =>
      globalCount(m.globals) + m.events.map(eventAtoms).sum + m.temps.size +
        m.having.map(SqlSynthesizer.countAtoms).getOrElse(0)
    case d: DependencyQuery =>
      // `forward`/`backward` is a single written constraint, not one per pair
      globalCount(d.globals) + d.events.map(eventAtoms).sum + 1
    case a: AnomalyQuery =>
      globalCount(a.globals) + eventAtoms(a.event) + 2 /* window, step */ +
        a.having.map(SqlSynthesizer.countAtoms).getOrElse(0)
  }

  private def globalCount(gs: Seq[Global]): Int = gs.size

  private def eventAtoms(e: EventPat): Int = {
    def atoms(f: Option[Expr]): Int = f.map(SqlSynthesizer.countAtoms).getOrElse(0)
    atoms(e.subj.filter) + atoms(e.obj.filter)
  }
}
