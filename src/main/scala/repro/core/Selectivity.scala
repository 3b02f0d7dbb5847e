package repro.core

import Ast._

/** Pruning-power estimation for event patterns (§2.3, insight 1).
  *
  * The engine prioritizes "event patterns with higher pruning power" to
  * shrink intermediate results as early as possible. Two estimators:
  *
  *  - **exact**: the engine counts each pattern's filtered scan (the scans
  *    are cached and reused by the join stages, so the count is not wasted
  *    work — it plays the role of the DB statistics the paper consults);
  *  - **heuristic** (this object): a static score from the predicate shape,
  *    used when counting is disabled. Higher score = more selective.
  */
object Selectivity {

  /** Static pruning-power score of one entity filter expression. */
  def scoreExpr(e: Expr): Double = e match {
    case Bin("&&", l, r) => scoreExpr(l) + scoreExpr(r)
    case Bin("||", l, r) => math.min(scoreExpr(l), scoreExpr(r))
    case Not(x)          => 0.5 * scoreExpr(x)
    case Bin("=", _, StrLit(s)) if s.contains("%") =>
      // LIKE: a leading wildcard can't use prefix pruning; longer literal
      // residue = rarer match.
      val residue = s.count(_ != '%')
      if (s.startsWith("%")) 1.0 + residue * 0.1 else 2.0 + residue * 0.1
    case Bin("=", _, _)  => 4.0   // exact equality: strongest single filter
    case Bin("!=", _, _) => 0.2
    case Bin(_, _, _)    => 1.0   // range comparison
    case _               => 0.0
  }

  /** Static pruning-power of a whole pattern: its filters plus the implicit
    * operation/object-type equalities every pattern carries.
    */
  def scorePattern(p: EventPat): Double = {
    val base = 0.5 // op = … && obj_type = … are weak (few distinct values)
    val filters = p.subj.filter.map(scoreExpr).getOrElse(0.0) +
                  p.obj.filter.map(scoreExpr).getOrElse(0.0)
    base + filters
  }

  /** Order pattern indices most-selective-first by static score (stable for
    * ties, so declaration order breaks them).
    */
  def heuristicOrder(ps: Seq[EventPat]): Seq[Int] =
    ps.indices.sortBy(i => (-scorePattern(ps(i)), i))
}
