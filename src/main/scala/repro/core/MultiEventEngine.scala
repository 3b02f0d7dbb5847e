package repro.core

import java.util.concurrent.Executors

import scala.concurrent.duration.Duration
import scala.concurrent.{Await, ExecutionContext, Future}

import org.apache.spark.sql.{Column, DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._

import Ast._
import repro.events.{EventSchema, EventStore}

/** Engine configuration — each flag is one of the paper's domain-specific
  * optimizations, individually toggleable for the ablation bench (T3).
  *
  * @param selectivityOrdering execute the most selective pattern first
  *                            (§2.3 insight 1: prioritize pruning power)
  * @param exactSelectivity    measure pruning power by counting each
  *                            pattern's (cached) filtered scan; otherwise a
  *                            static heuristic over the predicate shape
  * @param timeBoundPushdown   tighten later scans with dynamic ts bounds
  *                            derived from `before`/`after` chains
  * @param partitionPruning    prune `(agent_id, day)` store partitions from
  *                            the global constraints
  * @param spatialParallelism  split a multi-agent query into per-agent
  *                            sub-queries executed in parallel (§2.3
  *                            insight 2), when entity sharing keeps all
  *                            events host-local
  */
final case class AiqlConf(
    selectivityOrdering: Boolean = true,
    exactSelectivity: Boolean = true,
    timeBoundPushdown: Boolean = true,
    partitionPruning: Boolean = true,
    spatialParallelism: Boolean = true,
    parallelism: Int = 8,
    /** Dynamic ts-bound tightening costs one small aggregation job; it only
      * pays off when the pattern it would prune is large. The engine applies
      * it when the pattern's measured count exceeds this threshold — a
      * stats-informed scheduling decision like the paper's.
      */
    pushdownThreshold: Long = 100000,
    /** The paper's engine materializes small per-pattern results and probes
      * them instead of shuffling; the Spark analog is a broadcast-hash join.
      * Pattern frames whose measured count is at or below this threshold are
      * broadcast into the staged join (set < 0 to disable; the naive SQL
      * comparator has no stats and keeps default shuffle joins).
      */
    broadcastThreshold: Long = 200000,
)

/** Where the engine reads events from. */
sealed trait EventSource
/** The partitioned Parquet store ([[EventStore]]) — enables pruning. */
final case class StorePath(path: String) extends EventSource
/** An in-memory frame (tests). */
final case class InMemory(df: DataFrame) extends EventSource

/** Loads the base events for a query's global constraints, with partition
  * pruning and a hot-partition cache: the paper's store keeps the
  * partitions under investigation in memory (in-memory indexes /
  * hypertable); here the pruned base of each (agents, days) footprint is
  * cached on first use and reused by the statistics pass, every pattern
  * scan, and later queries over the same footprint. Release with [[close]].
  */
private[repro] final class BaseLoader(
    spark: SparkSession, source: EventSource, conf: AiqlConf) {

  private val cache = scala.collection.concurrent.TrieMap[
    (Option[Seq[Int]], Option[Seq[String]]), (DataFrame, Long)]()

  /** Unpersist every partition this loader pinned in memory. */
  def close(): Unit = {
    cache.values.foreach(_._1.unpersist())
    cache.clear()
  }

  def baseEvents(globals: Seq[Ast.Global]): DataFrame =
    baseEventsWithSize(globals)._1

  /** Base events for the globals plus, when known, the footprint's row
    * count. The residual global predicate is always applied on top of the
    * (possibly partition-pruned) scan. Only agent-bound footprints are
    * pinned and counted — they are small, and their size is the engine's
    * cheapest statistic (one count per footprint, amortized over every
    * query investigating that host); a day-wide footprint is left to the
    * vectorized Parquet scan, which outruns Spark's in-memory cache format
    * on wide rows.
    */
  def baseEventsWithSize(globals: Seq[Ast.Global]): (DataFrame, Option[Long]) = {
    val (df, rows) = source match {
      case InMemory(d) => (d, None)
      case StorePath(p) =>
        val agents = if (conf.partitionPruning) Times.agents(globals) else None
        val days =
          if (conf.partitionPruning)
            Times.window(globals).map { case (s, t) => Times.daysOf(s, t) }
          else None
        if (agents.isEmpty) (EventStore.readPruned(spark, p, agents, days), None)
        else {
          val (cached, n) = cache.getOrElseUpdate((agents, days), {
            val c = EventStore.readPruned(spark, p, agents, days).cache()
            (c, c.count())
          })
          (cached, Some(n))
        }
    }
    (df.filter(PatternCompiler.globalPred(globals)), rows)
  }
}

/** Executes multievent AIQL queries with the paper's optimized scheduling:
  * one data query per event pattern, most-selective-first staged joins,
  * dynamic time-bound tightening, and spatial query partitioning — instead
  * of handing one big multi-join SQL to the default scheduler.
  *
  * Result columns follow the `return` clause (shortcut aliases applied), so
  * results are directly comparable with the synthesized equivalent SQL.
  */
final class MultiEventEngine(
    spark: SparkSession,
    source: EventSource,
    conf: AiqlConf = AiqlConf(),
) {

  import MultiEventEngine._

  /** Run a multievent query and return the projected matches. */
  def execute(q: MultiEventQuery): DataFrame = {
    validate(q)
    val agents = Times.agents(q.globals)
    val partitionable = agents.exists(_.size > 1) && spatiallyPartitionable(q)
    if (conf.spatialParallelism && partitionable) executeParallel(q, agents.get)
    else executeSingle(q)
  }

  // ------------------------------------------------------------ validation

  private def validate(q: MultiEventQuery): Unit = {
    val aliases = q.events.map(_.alias)
    if (aliases.distinct.size != aliases.size)
      throw SemanticError(s"duplicate event aliases in ${aliases.mkString(",")}")
    val kinds = scala.collection.mutable.Map[String, String]()
    for (e <- q.events; (v, k, _) <- Ast.entityOccurrences(e)) {
      kinds.get(v).foreach { k0 =>
        if (k0 != k) throw SemanticError(s"variable '$v' used as both $k0 and $k")
      }
      kinds(v) = k
    }
    for (t <- q.temps; side <- Seq(t.left, t.right))
      if (!aliases.contains(side))
        throw SemanticError(s"temporal relation references undeclared event '$side'")
  }

  /** Per-agent partitioning is sound iff every match binds all events to one
    * host: the event graph with edges for shared *host-local* entity
    * variables must be connected (an `ip` variable does not pin events to a
    * host — that is what lets dependency queries cross hosts).
    */
  private[core] def spatiallyPartitionable(q: MultiEventQuery): Boolean = {
    val n = q.events.size
    if (n <= 1) return true
    val varKind = q.events.flatMap(Ast.entityOccurrences(_).map(o => o._1 -> o._2)).toMap
    val adj = Array.fill(n)(scala.collection.mutable.Set[Int]())
    for (i <- 0 until n; j <- (i + 1) until n) {
      val shared = (q.events(i).subj.name :: q.events(i).obj.name :: Nil).intersect(
                    q.events(j).subj.name :: q.events(j).obj.name :: Nil)
      if (shared.exists(v => Attrs.isHostLocal(varKind(v)))) { adj(i) += j; adj(j) += i }
    }
    val seen = scala.collection.mutable.Set(0)
    val stack = scala.collection.mutable.Stack(0)
    while (stack.nonEmpty) {
      for (nb <- adj(stack.pop()) if !seen(nb)) { seen += nb; stack.push(nb) }
    }
    seen.size == n
  }

  // --------------------------------------------------------------- source

  private val loader = new BaseLoader(spark, source, conf)
  private def baseEvents(globals: Seq[Global]): DataFrame = loader.baseEvents(globals)

  /** Per-query relevant-set caches, rotated so at most a handful stay
    * pinned (a result DataFrame may be collected after the next query has
    * begun — unpersisting merely degrades that to recompute).
    */
  private val relevantCaches = new java.util.ArrayDeque[DataFrame]()
  private def registerRelevant(df: DataFrame): DataFrame = {
    relevantCaches.synchronized {
      relevantCaches.addLast(df)
      while (relevantCaches.size > 8) relevantCaches.pollFirst().unpersist()
    }
    df
  }

  /** Release the hot-partition and relevant-set caches. */
  def close(): Unit = {
    loader.close()
    relevantCaches.synchronized {
      while (!relevantCaches.isEmpty) relevantCaches.pollFirst().unpersist()
    }
  }

  // ------------------------------------------------------------ execution

  /** §2.3 insight 2: independent per-agent sub-queries, materialized in
    * parallel (concurrent Spark actions), results unioned.
    */
  private def executeParallel(q: MultiEventQuery, agents: Seq[Int]): DataFrame = {
    val pool = Executors.newFixedThreadPool(math.max(1, math.min(conf.parallelism, agents.size)))
    implicit val ec: ExecutionContext = ExecutionContext.fromExecutor(pool)
    try {
      val subs = agents.map { a =>
        Future {
          val sub = q.copy(globals =
            q.globals.filterNot(_.isInstanceOf[AgentIn]) :+ AgentIn(Seq(a)))
          val df = executeSingle(sub)
          (df.schema, df.collect())
        }
      }
      val parts = Await.result(Future.sequence(subs), Duration.Inf)
      val schema = parts.head._1
      val rows: java.util.List[Row] = java.util.Arrays.asList(parts.flatMap(_._2): _*)
      spark.createDataFrame(rows, schema)
    } finally pool.shutdown()
  }

  /** Scan-time ts bounds (exclusive low / high) for one pattern, or None
    * when the bound state is already known empty.
    */
  private final case class TsBounds(lo: Option[Long], hi: Option[Long]) {
    def pred(tsCol: Column): Column = {
      var c = lit(true)
      lo.foreach(v => c = c && tsCol > v)
      hi.foreach(v => c = c && tsCol < v)
      c
    }
    def isUnbounded: Boolean = lo.isEmpty && hi.isEmpty
  }

  private def executeSingle(q: MultiEventQuery): DataFrame = {
    val (base, footRows) = loader.baseEventsWithSize(q.globals)
    val n = q.events.size
    val preds = q.events.map(PatternCompiler.compile)

    // Cost-based fast path: a footprint the store already measured as small
    // (one pinned host-day or similar) needs no per-pattern statistics —
    // every leg is bounded by the footprint, so everything can be broadcast
    // and ordered heuristically, and the whole query runs as one action.
    val smallFoot = conf.exactSelectivity && conf.broadcastThreshold >= 0 &&
      footRows.exists(_ <= conf.broadcastThreshold)

    // Relevant-set extraction: one pass over the (pruned) base keeps only
    // rows matching SOME pattern, projected to the columns the query can
    // touch; the statistics aggregation and every join leg then read this
    // much smaller cached set instead of re-scanning the base per pattern.
    // (With a small pinned footprint the base itself is the in-memory set.)
    val cols = usedColumns(q)
    val relevant =
      if (n <= 1 || smallFoot) base.select(cols.map(col): _*)
      else registerRelevant(
        base.filter(preds.reduce(_ || _)).select(cols.map(col): _*).cache())

    // one data query per pattern, columns prefixed with the event alias
    def prefixed(i: Int, extra: Column): DataFrame = {
      val a = q.events(i).alias
      relevant.filter(preds(i) && extra)
        .select(cols.map(c => col(c).as(s"${a}__$c")): _*)
    }

    // pruning-power statistics: ALL pattern counts from one scan (which
    // also materializes the relevant-set cache) — the engine's analog of
    // consulting DB stats. Skipped when they cannot influence anything.
    val wantStats = conf.exactSelectivity && n > 1 && !smallFoot &&
      (conf.selectivityOrdering || conf.timeBoundPushdown || conf.broadcastThreshold >= 0)
    val counts: Array[Long] =
      if (!wantStats) Array.fill(n)(-1L)
      else {
        val aggs = preds.map(p => count(when(p, lit(1))))
        relevant.agg(aggs.head, aggs.tail: _*).collect()(0)
          .toSeq.map(_.asInstanceOf[Long]).toArray
      }

    val order: Seq[Int] =
      if (!conf.selectivityOrdering) q.events.indices
      else if (wantStats) q.events.indices.sortBy(i => (counts(i), i))
      else Selectivity.heuristicOrder(q.events)

    val firstOcc = firstOccurrences(q.events)

    var state: DataFrame = null
    var stateEst: Long = -1L // running size upper-bound estimate of `state`
    var knownEmpty = counts.contains(0L)
    val bound = scala.collection.mutable.LinkedHashSet[String]()
    val boundVars = scala.collection.mutable.Map[String, (String, String, String)]()
    val remaining = scala.collection.mutable.ArrayBuffer(order: _*)

    while (remaining.nonEmpty) {
      // prefer patterns connected to the bound set (shared vars or temporal
      // relation — both yield join conditions), in selectivity order
      val pickPos = remaining.indexWhere(i => connected(q, i, bound, boundVars)) match {
        case -1 => 0
        case p  => p
      }
      val i = remaining.remove(pickPos)
      val e = q.events(i)

      // stats-gated dynamic tightening: worth an extra aggregation job only
      // when the pattern to be scanned is large AND the intermediate state
      // is not already small enough to broadcast (a broadcast probe makes
      // the join cheap regardless of the streamed side's size)
      val stateBroadcastable = conf.broadcastThreshold >= 0 &&
        ((stateEst >= 0 && stateEst <= conf.broadcastThreshold) || smallFoot)
      val wantBounds = conf.timeBoundPushdown && state != null && !knownEmpty &&
        !stateBroadcastable && (counts(i) < 0 || counts(i) > conf.pushdownThreshold)
      val bounds: TsBounds =
        if (!wantBounds) TsBounds(None, None)
        else timeBounds(q, e.alias, bound, state).getOrElse { knownEmpty = true; TsBounds(None, None) }

      val df = prefixed(i, if (knownEmpty) lit(false) else bounds.pred(col("ts")))

      if (state == null) { state = df; stateEst = counts(i) }
      else {
        // Stats-gated materialize-and-probe (the paper's engine keeps small
        // intermediate results in memory and probes large patterns with
        // them): broadcast whichever side the statistics say is small — the
        // new pattern, or the accumulated intermediate state. `stateEst` is
        // the running upper-bound estimate min(counts of joined patterns);
        // joins can only multiply through shared keys, which the staged
        // order keeps rare, so the smaller measured side wins the hint.
        def small(x: Long) = conf.broadcastThreshold >= 0 &&
          ((x >= 0 && x <= conf.broadcastThreshold) || (x < 0 && smallFoot))
        val (l, r) =
          if (small(counts(i)) && (!small(stateEst) || counts(i) <= stateEst))
            (state, broadcast(df))
          else if (small(stateEst)) (broadcast(state), df)
          else (state, df)
        joinCondition(q, i, bound, boundVars) match {
          case Some(c) => state = l.join(r, c, "inner")
          case None    => state = l.crossJoin(r)
        }
        if (counts(i) >= 0)
          stateEst = if (stateEst < 0) counts(i) else math.min(stateEst, counts(i))
      }

      bound += e.alias
      for ((v, k, r) <- Ast.entityOccurrences(e) if !boundVars.contains(v))
        boundVars(v) = (e.alias, k, r)
    }

    project(q, state, firstOcc)
  }

  // --------------------------------------------------------------- pieces

  /** Schema columns a query can reference: pattern predicates, join keys,
    * temporal/aggregation inputs, and every return/group/having leaf —
    * computed so the relevant-set cache stores only what is needed.
    */
  private def usedColumns(q: MultiEventQuery): Seq[String] = {
    val s = scala.collection.mutable.Set("op", "obj_type", "ts", "agent_id")
    val firstOcc = firstOccurrences(q.events)
    def exprCols(e: Expr, resolveVar: String => Option[(String, String)]): Unit = e match {
      case VarRef(v) => resolveVar(v).foreach { case (k, r) => s += Attrs.entityAttr(k, r, "") }
      case AttrRef(v, a) if q.events.exists(_.alias == v) => s += Attrs.eventAttr(a)
      case AttrRef(v, a) =>
        resolveVar(v).foreach { case (k, r) => s += Attrs.entityAttr(k, r, a) }
      case Bin(_, l, r) => exprCols(l, resolveVar); exprCols(r, resolveVar)
      case Not(x)       => exprCols(x, resolveVar)
      case Agg(_, a)    => exprCols(a, resolveVar)
      case _            =>
    }
    for (e <- q.events) {
      s += Attrs.joinKey(e.subj.kind, "subj")
      s += Attrs.joinKey(e.obj.kind, "obj")
      for (f <- e.subj.filter) exprCols(f, v => Some((e.subj.kind, "subj")))
      for (f <- e.obj.filter)  exprCols(f, v => Some((e.obj.kind, "obj")))
    }
    val globalResolve = (v: String) => firstOcc.get(v).map { case (_, k, r) => (k, r) }
    for (r <- q.returns) exprCols(r.expr, globalResolve)
    for (g <- q.groupBy) exprCols(g, globalResolve)
    for (h <- q.having)  exprCols(h, globalResolve)
    EventSchema.columns.filter(s.contains)
  }

  private def firstOccurrences(events: Seq[EventPat]): Map[String, (String, String, String)] = {
    val m = scala.collection.mutable.LinkedHashMap[String, (String, String, String)]()
    for (e <- events; (v, k, r) <- Ast.entityOccurrences(e) if !m.contains(v))
      m(v) = (e.alias, k, r)
    m.toMap
  }

  private def connected(q: MultiEventQuery, i: Int, bound: collection.Set[String],
                        boundVars: collection.Map[String, (String, String, String)]): Boolean = {
    val e = q.events(i)
    val sharesVar = Ast.entityOccurrences(e).exists { case (v, _, _) => boundVars.contains(v) }
    val hasTemp = q.temps.exists(t =>
      (t.left == e.alias && bound(t.right)) || (t.right == e.alias && bound(t.left)))
    sharesVar || hasTemp
  }

  /** Join condition between pattern i and the already-bound state: entity
    * identity equalities (plus `agent_id` equality for host-local entities)
    * and any temporal relations whose other side is bound.
    */
  private def joinCondition(q: MultiEventQuery, i: Int, bound: collection.Set[String],
                            boundVars: collection.Map[String, (String, String, String)]): Option[Column] = {
    val e = q.events(i)
    var cond: Option[Column] = None
    def and(c: Column): Unit = cond = Some(cond.fold(c)(_ && c))

    for ((v, k, r) <- Ast.entityOccurrences(e); (bEvt, bKind, bRole) <- boundVars.get(v)) {
      if (bEvt != e.alias) {
        and(col(s"${bEvt}__${Attrs.joinKey(bKind, bRole)}") ===
            col(s"${e.alias}__${Attrs.joinKey(k, r)}"))
        if (Attrs.isHostLocal(k))
          and(col(s"${bEvt}__agent_id") === col(s"${e.alias}__agent_id"))
      }
    }
    for (t <- q.temps) {
      val pair: Option[(String, String)] =
        if (t.left == e.alias && bound(t.right)) Some((t.left, t.right))
        else if (t.right == e.alias && bound(t.left)) Some((t.left, t.right))
        else None
      for ((l, r) <- pair) {
        val (early, late) = if (t.rel == "before") (l, r) else (r, l)
        and(col(s"${early}__ts") < col(s"${late}__ts"))
      }
    }
    cond
  }

  /** Dynamic ts bounds for the pattern about to be joined: if `l before new`
    * for a bound `l`, matching rows need `ts > min(l.ts over candidates)`;
    * symmetrically for upper bounds. None ⇒ the state has no rows.
    */
  private def timeBounds(q: MultiEventQuery, alias: String,
                         bound: collection.Set[String], state: DataFrame): Option[TsBounds] = {
    val lows = q.temps.collect {
      case TempRel(l, "before", r) if r == alias && bound(l) => l
      case TempRel(l, "after", r)  if l == alias && bound(r) => r
    }.distinct
    val highs = q.temps.collect {
      case TempRel(l, "before", r) if l == alias && bound(r) => r
      case TempRel(l, "after", r)  if r == alias && bound(l) => l
    }.distinct
    if (lows.isEmpty && highs.isEmpty) return Some(TsBounds(None, None))
    val aggs = lows.map(l => min(col(s"${l}__ts"))) ++ highs.map(h => max(col(s"${h}__ts")))
    val row = state.agg(aggs.head, aggs.tail: _*).collect()(0)
    if (row.anyNull) return None
    val lo = if (lows.nonEmpty) Some(lows.indices.map(row.getLong).min) else None
    val hi = if (highs.nonEmpty) Some(highs.indices.map(k => row.getLong(lows.size + k)).max) else None
    Some(TsBounds(lo, hi))
  }

  // ----------------------------------------------------------- projection

  /** Resolve `return` / `group by` items against the joined, prefixed state. */
  private def project(q: MultiEventQuery, state: DataFrame,
                      firstOcc: Map[String, (String, String, String)]): DataFrame = {
    val aliases = q.events.map(_.alias).toSet

    def resolveLeaf(e: Expr): Column = e match {
      case VarRef(v) if aliases(v) =>
        throw SemanticError(s"bare event alias '$v' is not returnable; use $v.<attr>")
      case VarRef(v) =>
        val (evt, kind, role) = firstOcc.getOrElse(v, throw SemanticError(s"unknown variable '$v'"))
        col(s"${evt}__${Attrs.entityAttr(kind, role, "")}")
      case AttrRef(v, a) if aliases(v) => col(s"${v}__${Attrs.eventAttr(a)}")
      case AttrRef(v, a) =>
        val (evt, kind, role) = firstOcc.getOrElse(v, throw SemanticError(s"unknown variable '$v'"))
        col(s"${evt}__${Attrs.entityAttr(kind, role, a)}")
      case other => throw SemanticError(s"unresolvable expression $other")
    }

    val hasAgg = q.returns.exists(r => ExprEval.hasAgg(r.expr))
    if (!hasAgg) {
      val cols = q.returns.map(r =>
        ExprEval.toColumn(r.expr, resolveLeaf).as(r.alias.getOrElse(defaultAlias(r.expr))))
      state.select(cols: _*)
    } else {
      if (q.groupBy.isEmpty && q.returns.exists(r => !ExprEval.hasAgg(r.expr)))
        throw SemanticError("non-aggregate return items require 'group by'")
      // name group keys after the return item that matches them (or a
      // positional name), aggregate the rest
      def keyName(g: Expr): String =
        q.returns.find(_.expr == g).flatMap(_.alias)
          .getOrElse(defaultAlias(g))
      val keyCols = q.groupBy.map(g => ExprEval.toColumn(g, resolveLeaf).as(keyName(g)))
      val aggCols = q.returns.collect {
        case ReturnItem(e, al) if ExprEval.hasAgg(e) =>
          aggColumnOf(e, resolveLeaf).as(al.getOrElse(defaultAlias(e)))
      }
      val grouped =
        if (keyCols.isEmpty) state.agg(aggCols.head, aggCols.tail: _*)
        else state.groupBy(keyCols: _*).agg(aggCols.head, aggCols.tail: _*)
      val outNames = q.returns.map { r =>
        if (ExprEval.hasAgg(r.expr)) r.alias.getOrElse(defaultAlias(r.expr))
        else {
          val g = q.groupBy.find(_ == r.expr).getOrElse(
            throw SemanticError(s"return item ${r.expr} is neither aggregated nor grouped"))
          keyName(g)
        }
      }
      grouped.select(outNames.map(col): _*)
    }
  }

  private def aggColumnOf(e: Expr, resolve: Expr => Column): Column = e match {
    case Agg("count", VarRef(_)) => count(lit(1))
    case Agg(f, arg)             => ExprEval.aggColumn(f, ExprEval.toColumn(arg, resolve))
    case other => throw SemanticError(s"expected aggregate, got $other")
  }
}

object MultiEventEngine {

  final case class SemanticError(msg: String) extends RuntimeException(msg)

  /** Default output-column names for unaliased return items — the engine and
    * [[SqlSynthesizer]] must agree exactly so results are diffable.
    */
  def defaultAlias(e: Expr): String = e match {
    case VarRef(v)     => v
    case AttrRef(v, a) => s"${v}_$a"
    case Agg(f, arg)   => s"${f}_${defaultAlias(arg)}"
    case _             => "expr"
  }
}
