package repro.baselines

import scala.collection.mutable

import repro.core.PaneAgg
import repro.events.Event
import repro.hamlet.ChannelSpec
import repro.metrics.Metrics
import repro.query.CompiledQuery

/** MCEP-style baseline [22]: the most recent *shared two-step* approach.
  * It shares event trend **construction** across queries, then aggregates
  * the constructed trends — so unlike the online engines it pays the
  * exponential trend-enumeration cost (§1 "Challenges", §7).
  *
  * Construction sharing is modeled as in multi-pattern NFA sharing: one
  * DFS over the merged graph carries the set of queries for which the
  * current trend (prefix) is still valid; a trend is counted for every
  * query whose end type it reaches. Aggregates are computed from the
  * materialized trend (two-step), not incrementally.
  *
  * `maxVisits` caps DFS steps so benches terminate; hitting the cap is
  * reported (`truncated`) and the result is a lower bound (DESIGN.md,
  * deviations).
  */
object McepEngine {

  final case class Out(aggs: Map[String, PaneAgg], truncated: Boolean)

  def processPane(
      queries: Seq[CompiledQuery],
      events: Seq[Event],
      metrics: Metrics,
      maxVisits: Long = 20_000_000L,
  ): Out = {
    val t0 = System.nanoTime()
    val k = queries.size
    val channels = ChannelSpec.forQueries(queries)
    val nCh = channels.size
    val universe = queries.flatMap(_.tpl.typeUniverse).toSet
    val evs = events.filter(e => universe.contains(e.typ)).toArray
    val n = evs.length

    // Per-query matched flags and negation indices.
    val matched = Array.tabulate(k, n)((qi, i) => queries(qi).q.matches(evs(i)))
    // Trailing negation: for query qi, ids (indices) of matched neg events.
    val trailNeg: Array[Array[Int]] = queries.indices.map { qi =>
      val negs = queries(qi).tpl.trailingNegs
      evs.indices.filter(i => negs.contains(evs(i).typ) && matched(qi)(i)).toArray
    }.toArray
    // Mid negation: (query, barrier) -> sorted indices of matched neg events.
    val midNeg: Array[Array[Array[Int]]] = queries.indices.map { qi =>
      queries(qi).tpl.midNegs.map { nb =>
        evs.indices.filter(i => evs(i).typ == nb.negType && matched(qi)(i)).toArray
      }.toArray
    }.toArray

    def hasBetween(sorted: Array[Int], lo: Int, hi: Int): Boolean = {
      // any index strictly between lo and hi
      var a = 0; var b = sorted.length
      while (a < b) { val m = (a + b) / 2; if (sorted(m) <= lo) a = m + 1 else b = m }
      a < sorted.length && sorted(a) < hi
    }
    def hasAfter(sorted: Array[Int], i: Int): Boolean =
      sorted.nonEmpty && sorted.last > i

    // Edge validity of (i -> j) for query qi: transition + predicates +
    // edge predicate (Kleene-adjacent pairs) + mid-neg barriers.
    def edgeOk(qi: Int, i: Int, j: Int): Boolean = {
      val tpl = queries(qi).tpl
      val (ft, tt) = (evs(i).typ, evs(j).typ)
      if (!tpl.transitions.contains((ft, tt))) return false
      if (!matched(qi)(j)) return false
      queries(qi).q.edgePred match {
        case Some(ep) if ft == tt => if (!ep(evs(i), evs(j))) return false
        case _                    =>
      }
      val negs = queries(qi).tpl.midNegs
      var b = 0
      while (b < negs.length) {
        val nb = negs(b)
        if (nb.fromTypes.contains(ft) && nb.toTypes.contains(tt) &&
            hasBetween(midNeg(qi)(b), i, j)) return false
        b += 1
      }
      true
    }

    val finals = Array.fill(k)(new Array[Double](nCh))
    val finMin = Array.fill(k)(Double.PositiveInfinity)
    val finMax = Array.fill(k)(Double.NegativeInfinity)
    var visits = 0L
    var truncated = false
    var peakDepth = 0

    // The materialized current trend (two-step: aggregate from the trend).
    val trend = mutable.ArrayBuffer.empty[Int]

    def completeFor(qi: Int, last: Int): Unit = {
      if (!queries(qi).tpl.endTypes.contains(evs(last).typ)) return
      if (hasAfter(trailNeg(qi), last)) return
      val q = queries(qi)
      finals(qi)(0) += 1.0
      // Aggregate the constructed trend (the "second step").
      var ch = 1
      while (ch < nCh) {
        val spec = channels(ch)
        var acc = 0.0
        trend.foreach { i =>
          if (spec.injType.contains(evs(i).typ))
            acc += spec.attr.map(a => evs(i).num.getOrElse(a, 0.0)).getOrElse(1.0)
        }
        finals(qi)(ch) += acc
        ch += 1
      }
      q.q.agg match {
        case repro.query.Agg.Min(t, a) =>
          trend.foreach(i => if (evs(i).typ == t) finMin(qi) = math.min(finMin(qi), evs(i).num.getOrElse(a, Double.PositiveInfinity)))
        case repro.query.Agg.Max(t, a) =>
          trend.foreach(i => if (evs(i).typ == t) finMax(qi) = math.max(finMax(qi), evs(i).num.getOrElse(a, Double.NegativeInfinity)))
        case _ =>
      }
    }

    def dfs(last: Int, active: Array[Boolean]): Unit = {
      if (truncated) return
      var j = last + 1
      while (j < n && !truncated) {
        visits += 1
        if (visits > maxVisits) { truncated = true; return }
        val next = new Array[Boolean](k)
        var any = false
        var qi = 0
        while (qi < k) {
          if (active(qi) && edgeOk(qi, last, j)) { next(qi) = true; any = true }
          qi += 1
        }
        if (any) {
          trend += j
          peakDepth = math.max(peakDepth, trend.size)
          var q2 = 0
          while (q2 < k) { if (next(q2)) completeFor(q2, j); q2 += 1 }
          dfs(j, next)
          trend.remove(trend.size - 1)
        }
        j += 1
      }
    }

    var i = 0
    while (i < n && !truncated) {
      val init = new Array[Boolean](k)
      var any = false
      var qi = 0
      while (qi < k) {
        if (queries(qi).tpl.startTypes.contains(evs(i).typ) && matched(qi)(i)) {
          init(qi) = true; any = true
        }
        qi += 1
      }
      if (any) {
        visits += 1
        trend += i
        var q2 = 0
        while (q2 < k) { if (init(q2)) completeFor(q2, i); q2 += 1 }
        dfs(i, init)
        trend.remove(trend.size - 1)
      }
      i += 1
    }

    metrics.events += n
    metrics.wallNanos += System.nanoTime() - t0
    metrics.evalOps += visits
    metrics.observeBytes(n.toLong * 48 + peakDepth.toLong * 16 + k.toLong * nCh * 8)

    val aggs = queries.zipWithIndex.map { case (q, qi) =>
      val nIdx = channels.indexWhere(_.name == "N")
      val sIdx = q.q.agg match {
        case repro.query.Agg.Sum(_, a) => channels.indexWhere(_.name == s"S:$a")
        case repro.query.Agg.Avg(_, a) => channels.indexWhere(_.name == s"S:$a")
        case _                         => -1
      }
      q.id -> PaneAgg(
        c = finals(qi)(0),
        n = if (nIdx >= 0) finals(qi)(nIdx) else 0.0,
        s = if (sIdx >= 0) finals(qi)(sIdx) else 0.0,
        mn = finMin(qi), mx = finMax(qi))
    }.toMap
    Out(aggs, truncated)
  }
}
