package repro.core

import Ast._

/** Compiles dependency queries to semantically equivalent multievent queries
  * (§2.3: "for a dependency query, the parser compiles it to a semantically
  * equivalent multievent query for execution").
  *
  * A `forward` path means causality flows left-to-right: each declared event
  * occurs *before* the next (`evt_i before evt_{i+1}`), so the ramification
  * of the first event can be tracked through shared entities (files,
  * processes, and — across hosts — network connections). `backward` reverses
  * the temporal chain, tracking toward the attack entry.
  */
object DependencyCompiler {

  final case class DependencyError(msg: String) extends RuntimeException(msg)

  def compile(q: DependencyQuery): MultiEventQuery = {
    if (q.events.isEmpty) throw DependencyError("dependency query has no events")
    val rel = q.direction match {
      case "forward"  => "before"
      case "backward" => "after"
      case other      => throw DependencyError(s"unknown direction '$other'")
    }
    val temps = q.events.sliding(2).collect {
      case Seq(a, b) => TempRel(a.alias, rel, b.alias)
    }.toSeq
    // Soundness: consecutive path steps must be linked by a shared entity —
    // otherwise the "path" is an unconstrained cross product.
    for (Seq(a, b) <- q.events.sliding(2)) {
      val va = Set(a.subj.name, a.obj.name)
      val vb = Set(b.subj.name, b.obj.name)
      if ((va & vb).isEmpty)
        throw DependencyError(
          s"events '${a.alias}' and '${b.alias}' share no entity; dependency paths must chain entities")
    }
    MultiEventQuery(q.globals, q.events, temps, q.returns, Seq.empty, None)
  }
}
