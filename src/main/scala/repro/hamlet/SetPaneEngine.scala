package repro.hamlet

import scala.collection.mutable

import repro.core.{LinExpr, PaneAgg}
import repro.events.Event
import repro.metrics.Metrics
import repro.query.{CompiledQuery, NegBarrier}

/** Online trend aggregation over one (group, pane) for one set of queries.
  *
  * This single engine implements both execution strategies of the paper:
  *
  *  - **Non-shared** (§3.2, Greta [33]): per-query event graphs whose
  *    intermediate aggregates are plain numbers; each new event walks all
  *    stored predecessor events (Equations 1–3) — O(n) per event per
  *    query, the published cost profile (the `n` term of Eq. 8).
  *  - **Shared** (§3.3, Algorithm 1): one graphlet per burst of the
  *    sharable Kleene type, whose intermediate aggregates are linear
  *    expressions over *snapshots* — created at graphlet level when the
  *    graphlet opens (Definition 8) and at event level whenever per-query
  *    predicates/edge predicates make an event's predecessor set diverge
  *    across the sharing queries (Definition 9).
  *
  * The [[SharingPolicy]] decides per burst which strategy runs and for
  * which subset of queries (§4.2 split/merge, §4.3 query-set choice).
  * Runtime switching needs no state migration, exactly as the paper
  * argues: a *merge* materializes a graphlet-level snapshot whose
  * per-query values consolidate everything processed so far (per-query
  * node walk + closed shared-graphlet sums — the O(k·g·t) merge cost of
  * §4.2); a *split* "comes for free" — per-query graph construction just
  * continues, with closed shared graphlets contributing at aggregate
  * granularity (the paper's "snapshot x is replaced by its value per
  * query").
  *
  * Not thread-safe; instantiate per (group, pane).
  */
final class SetPaneEngine(
    val queries: Vector[CompiledQuery],
    val sharedType: Option[String],
    val channels: Vector[ChannelSpec],
    val policy: SharingPolicy,
    val metrics: Metrics,
) {
  require(channels.nonEmpty && channels.head.name == "C", "channel 0 must be C")
  private val k   = queries.size
  private val nCh = channels.size
  private val ChC = 0

  private val typeUniverse: Set[String] = queries.flatMap(_.tpl.typeUniverse).toSet
  private val anyEdgePred = queries.exists(_.q.edgePred.isDefined)

  // ------------------------------------------------------------------
  // Per-query state (non-shared graph + shared-close sums + finals)
  // ------------------------------------------------------------------
  /** A stored per-query event node: channel values + trend-scoped min/max. */
  private final class Node(val e: Event, val v: Array[Double], val mn: Double, val mx: Double)

  private final class QState(val idx: Int, val cq: CompiledQuery) {
    val tpl = cq.tpl
    val barriers: Vector[(Int, NegBarrier)] = tpl.midNegs.zipWithIndex.map(_.swap).toVector
    val hasEdge = cq.q.edgePred.isDefined

    /** Non-shared graph nodes of this pane (plus, for edge-predicate
      * queries, materialized per-query values of shared-processed events —
      * same-type pairs must be filterable per predecessor).
      */
    val nodes = mutable.ArrayBuffer.empty[Node]
    /** Σ of this query's values over events of *closed shared graphlets*,
      * per type — the aggregate-granularity stand-in for those events in
      * later walks ("snapshot replaced by its value per query", §4.2).
      */
    val cumShared = mutable.HashMap.empty[String, Array[Double]]
    /** Σ of this query's values over *all* processed events per type
      * (nodes + closed shared graphlets) — lets a merge price its
      * graphlet-level snapshot from aggregates instead of re-walking the
      * graph (§4.2: merge cost is linear, not quadratic).
      */
    val cumAll = mutable.HashMap.empty[String, Array[Double]]
    /** cum tables captured at the last matching mid-pattern negation:
      * the part blocked from crossing the barrier.
      */
    val blocked = mutable.HashMap.empty[(Int, String), Array[Double]]
    val blockedAll = mutable.HashMap.empty[(Int, String), Array[Double]]

    def addCum(tbl: mutable.HashMap[String, Array[Double]], typ: String, v: Array[Double]): Unit = {
      val tgt = tbl.getOrElseUpdate(typ, new Array[Double](nCh))
      var ch = 0
      while (ch < nCh) { tgt(ch) += v(ch); ch += 1 }
    }

    /** All-events contribution of type `T` to a new `toType` event, net of
      * negation barriers — the merge-time snapshot value source.
      */
    def allCum(T: String, toType: String, ch: Int): Double = {
      val base = cumAll.get(T).map(_(ch)).getOrElse(0.0)
      var bl = 0.0
      barriers.foreach { case (bi, nb) =>
        if (nb.fromTypes.contains(T) && nb.toTypes.contains(toType))
          blockedAll.get((bi, T)).foreach(a => bl = math.max(bl, a(ch)))
      }
      base - bl
    }
    /** Last matched negative-event id per barrier (kills node edges). */
    val lastNeg: Array[Long] = Array.fill(tpl.midNegs.size)(-1L)

    val finalAcc = new Array[Double](nCh)
    var finalMin = Double.PositiveInfinity
    var finalMax = Double.NegativeInfinity
    var lastNSTyp: String = _

    val (mmTyp, mmAttr) = cq.q.agg match {
      case repro.query.Agg.Min(t, a) => (t, a)
      case repro.query.Agg.Max(t, a) => (t, a)
      case _                         => (null: String, null: String)
    }
    require(mmTyp == null || tpl.midNegs.isEmpty,
      s"${cq.id}: MIN/MAX with mid-pattern negation is unsupported (DESIGN.md)")

    /** Edge validity from stored node `p` to a new event `e`.
      * `applyEdgePred = false` skips the same-type filter (used at
      * graphlet open, where the reference event is synthetic and sharing
      * uniformity guarantees the unfiltered sum is the right value).
      */
    def edgeOk(p: Node, e: Event, applyEdgePred: Boolean): Boolean = {
      if (applyEdgePred) cq.q.edgePred match {
        case Some(ep) if p.e.typ == e.typ => if (!ep(p.e, e)) return false
        case _                            =>
      }
      var b = 0
      while (b < barriers.size) {
        val (bi, nb) = barriers(b)
        if (lastNeg(bi) >= 0 && p.e.id < lastNeg(bi) &&
            nb.fromTypes.contains(p.e.typ) && nb.toTypes.contains(e.typ)) return false
        b += 1
      }
      true
    }

    /** Whether the edge predicate admits every stored same-type
      * predecessor of `e` (then filtered and shared sums agree).
      */
    def edgeAllPass(e: Event): Boolean = {
      val ep = cq.q.edgePred.get
      nodes.forall(n => n.e.typ != e.typ || ep(n.e, e))
    }

    /** Closed-shared-graphlet contribution of type `T` to a new `toType`
      * event, net of negation barriers (the latest negation dominates
      * because cumShared is non-decreasing).
      */
    def sharedCum(T: String, toType: String, ch: Int): Double = {
      val base = cumShared.get(T).map(_(ch)).getOrElse(0.0)
      var bl = 0.0
      barriers.foreach { case (bi, nb) =>
        if (nb.fromTypes.contains(T) && nb.toTypes.contains(toType))
          blocked.get((bi, T)).foreach(a => bl = math.max(bl, a(ch)))
      }
      base - bl
    }

    /** Predecessor input of a new event of type `typ`: the faithful walk
      * over stored nodes plus the aggregate shared-close sums. Edge-pred
      * queries skip the shared sums of their Kleene type — those events
      * are materialized in `nodes` instead.
      */
    def predecessorBase(e: Event, typ: String,
                        applyEdgePred: Boolean = true): (Array[Double], Double, Double) = {
      val pt = tpl.predTypes(typ)
      val v = new Array[Double](nCh)
      var mn = Double.PositiveInfinity
      var mx = Double.NegativeInfinity
      var j = 0
      while (j < nodes.size) { // O(n) per event: the published NS cost
        val p = nodes(j)
        metrics.evalOps += 1
        if (pt.contains(p.e.typ) && edgeOk(p, e, applyEdgePred)) {
          var ch = 0
          while (ch < nCh) { v(ch) += p.v(ch); ch += 1 }
          mn = math.min(mn, p.mn)
          mx = math.max(mx, p.mx)
        }
        j += 1
      }
      pt.foreach { T =>
        if (!(hasEdge && sharedType.contains(T))) {
          var ch = 0
          while (ch < nCh) { v(ch) += sharedCum(T, typ, ch); ch += 1 }
        }
      }
      (v, mn, mx)
    }

    /** Index of this query's value channels in the engine layout (-1 when
      * the query's aggregate does not use the channel).
      */
    val nIdx = cq.q.agg match {
      case repro.query.Agg.CountE(_) | repro.query.Agg.Avg(_, _) =>
        channels.indexWhere(_.name == "N")
      case _ => -1
    }
    val sIdx = cq.q.agg match {
      case repro.query.Agg.Sum(_, a) => channels.indexWhere(_.name == s"S:$a")
      case repro.query.Agg.Avg(_, a) => channels.indexWhere(_.name == s"S:$a")
      case _                         => -1
    }
  }

  private val qs: Vector[QState] = queries.zipWithIndex.map { case (q, i) => new QState(i, q) }

  /** Non-shared processing of one matched event (Equations 1–3). */
  private def processNS(st: QState, e: Event): Unit = {
    val typ = e.typ
    if (st.lastNSTyp != typ) { st.lastNSTyp = typ; metrics.graphlets += 1 }
    val (v, pMn, pMx) = st.predecessorBase(e, typ)
    if (st.tpl.startTypes.contains(typ)) v(ChC) += 1.0
    var ch = 1
    while (ch < nCh) {
      val spec = channels(ch)
      if (spec.injType.contains(typ)) {
        val inj = spec.attr.map(a => e.num.getOrElse(a, 0.0)).getOrElse(1.0)
        v(ch) += inj * v(ChC)
      }
      ch += 1
    }
    var mn = pMn
    var mx = pMx
    if (st.mmTyp != null && typ == st.mmTyp && v(ChC) > 0) {
      e.num.get(st.mmAttr).foreach { a => mn = math.min(mn, a); mx = math.max(mx, a) }
    }
    if (v(ChC) == 0) { mn = Double.PositiveInfinity; mx = Double.NegativeInfinity }
    st.nodes += new Node(e, v, mn, mx)
    st.addCum(st.cumAll, typ, v)
    if (st.tpl.endTypes.contains(typ)) {
      ch = 0
      while (ch < nCh) { st.finalAcc(ch) += v(ch); ch += 1 }
      st.finalMin = math.min(st.finalMin, mn)
      st.finalMax = math.max(st.finalMax, mx)
    }
  }

  // ------------------------------------------------------------------
  // Shared graphlet (linear expressions over snapshots)
  // ------------------------------------------------------------------
  private var shActive  = false
  private var shMembers: Vector[Int] = Vector.empty
  private var shInput: Array[LinExpr] = _
  private val shEvents = mutable.ArrayBuffer.empty[(Event, Array[LinExpr])]

  /** Predecessor input of a new event in the shared graphlet: the
    * graphlet-input snapshot plus the expressions of all stored events —
    * the O(n·s) walk of §3.3's complexity analysis (sharing saves the ×k,
    * not the walk).
    */
  private def sumEventExprs(ch: Int): LinExpr = {
    var acc = shInput(ch)
    var j = 0
    while (j < shEvents.size) {
      acc = acc + shEvents(j)._2(ch)
      metrics.evalOps += shEvents(j)._2(ch).size.toLong
      j += 1
    }
    acc
  }

  /** Same walk, evaluated for one query (divergent events, Definition 9). */
  private def sumEventValues(ch: Int, qIdx: Int): Double = {
    var acc = evalExpr(shInput(ch), qIdx)
    var j = 0
    while (j < shEvents.size) { acc += evalExpr(shEvents(j)._2(ch), qIdx); j += 1 }
    acc
  }
  /** Snapshot table S: snapshot id → per-query → per-channel value. */
  private val snapVals = mutable.HashMap.empty[Long, Array[Array[Double]]]
  private var nextSnap = 0L

  private def evalExpr(expr: LinExpr, qIdx: Int): Double = {
    metrics.evalOps += expr.size.toLong
    expr.eval((snap, ch) => snapVals(snap)(qIdx)(ch))
  }

  /** Open a shared graphlet for `members`: create the graphlet-level
    * snapshot (Definition 8) valued per query from everything processed so
    * far. This is also exactly the *merge* of §4.2, with its O(k·g·t)
    * node-walk cost.
    */
  private def openShared(members: Vector[Int], typ: String): Unit = {
    val snap = nextSnap; nextSnap += 1
    val vals = Array.fill(k)(new Array[Double](nCh))
    members.foreach { i =>
      val st = qs(i)
      // Snapshot value from per-type aggregates (Definition 8 / Eq. 5):
      // merge prices in O(channels × predecessor types) per query instead
      // of re-walking the per-query graphs. Uniformity at merge time makes
      // the unfiltered aggregate the right value for edge-pred queries too.
      val pt = st.tpl.predTypes(typ)
      val v = new Array[Double](nCh)
      pt.foreach { T =>
        var ch = 0
        while (ch < nCh) { v(ch) += st.allCum(T, typ, ch); ch += 1 }
      }
      vals(i) = v
      metrics.evalOps += pt.size.toLong * nCh
    }
    snapVals(snap) = vals
    shInput = Array.tabulate(nCh)(ch => LinExpr.ofSnap(snap, ch))
    shEvents.clear()
    shMembers = members
    shActive = true
    metrics.snapshotsCreated += 1
    metrics.graphlets += 1
    metrics.sharedGraphlets += 1
  }

  /** Close the active shared graphlet: evaluate the per-query sums of its
    * events, fold them into the shared-close sums and final accumulators,
    * and drop the snapshot table (no live expression references it
    * anymore). After this, per-query non-shared graph construction simply
    * continues — the *split* of §4.2.
    */
  private def closeShared(): Unit = if (shActive) {
    val typ = sharedType.get
    shMembers.foreach { i =>
      val st = qs(i)
      val isEnd = st.tpl.endTypes.contains(typ)
      val v = new Array[Double](nCh)
      var ch = 0
      while (ch < nCh) {
        var acc = 0.0
        var j = 0
        while (j < shEvents.size) { acc += evalExpr(shEvents(j)._2(ch), i); j += 1 }
        v(ch) = acc
        if (isEnd) st.finalAcc(ch) += v(ch)
        ch += 1
      }
      // Edge-pred members already materialized each shared event into
      // their graph (nodes + cumAll); adding the graphlet sum again would
      // double count.
      if (!st.hasEdge) {
        st.addCum(st.cumShared, typ, v)
        st.addCum(st.cumAll, typ, v)
      }
    }
    shActive = false
    shEvents.clear()
    snapVals.clear()
  }

  /** Shared processing of one event (Algorithm 1, lines 16–21). */
  private def processShared(e: Event, typ: String): Unit = {
    val matched = shMembers.map(i => queries(i).q.matches(e))
    if (!matched.exists(identity)) return // matched by no sharing query: skip
    val startFlags = shMembers.map(i => qs(i).tpl.startTypes.contains(typ))
    // Edge predicates filter every same-type adjacent pair; sharing stays
    // uniform only while every edge-predicate member admits every stored
    // predecessor (then the filtered sum equals the shared one).
    val edgeUniform = !anyEdgePred || shMembers.zipWithIndex.forall { case (i, mi) =>
      !qs(i).hasEdge || !matched(mi) || qs(i).edgeAllPass(e)
    }
    val uniform = matched.forall(identity) && startFlags.distinct.size == 1 && edgeUniform

    val exprs = new Array[LinExpr](nCh)
    if (uniform) {
      val start = if (startFlags.head) 1.0 else 0.0
      var ch = 0
      while (ch < nCh) { exprs(ch) = sumEventExprs(ch); ch += 1 }
      exprs(ChC) = exprs(ChC) + start
      ch = 1
      while (ch < nCh) {
        val spec = channels(ch)
        if (spec.injType.contains(typ)) {
          val inj = spec.attr.map(a => e.num.getOrElse(a, 0.0)).getOrElse(1.0)
          exprs(ch) = exprs(ch) + exprs(ChC) * inj
        }
        ch += 1
      }
    } else {
      // Event-level snapshot (Definition 9): per-query values computed
      // eagerly, after which propagation continues shared.
      val snap = nextSnap; nextSnap += 1
      val vals = Array.fill(k)(new Array[Double](nCh))
      shMembers.zipWithIndex.foreach { case (i, mi) =>
        if (matched(mi)) {
          val st = qs(i)
          val base = new Array[Double](nCh)
          if (st.hasEdge) {
            // Filtered predecessors via the per-query graph walk.
            val (v, _, _) = st.predecessorBase(e, typ)
            Array.copy(v, 0, base, 0, nCh)
          } else {
            var ch = 0
            while (ch < nCh) { base(ch) = sumEventValues(ch, i); ch += 1 }
          }
          val c = base(ChC) + (if (startFlags(mi)) 1.0 else 0.0)
          vals(i)(ChC) = c
          var ch = 1
          while (ch < nCh) {
            val spec = channels(ch)
            val inj =
              if (spec.injType.contains(typ))
                spec.attr.map(a => e.num.getOrElse(a, 0.0)).getOrElse(1.0)
              else 0.0
            vals(i)(ch) = base(ch) + inj * c
            ch += 1
          }
        } // else: unmatched -> all-zero values (event invisible to i)
      }
      snapVals(snap) = vals
      metrics.snapshotsCreated += 1
      var ch = 0
      while (ch < nCh) { exprs(ch) = LinExpr.ofSnap(snap, ch); ch += 1 }
    }
    shEvents += ((e, exprs))
    // Edge-predicate members materialize their per-query value of this
    // event into their graph (predecessor base for later filtered walks).
    shMembers.zipWithIndex.foreach { case (i, mi) =>
      if (qs(i).hasEdge && matched(mi)) {
        val v = Array.tabulate(nCh)(ch => evalExpr(exprs(ch), i))
        qs(i).nodes += new Node(e, v, Double.PositiveInfinity, Double.NegativeInfinity)
        qs(i).addCum(qs(i).cumAll, e.typ, v)
      }
    }
    metrics.observeTerms(exprs(ChC).size.toLong)
  }

  // ------------------------------------------------------------------
  // Pane processing: burst segmentation, per-burst decisions, flush
  // ------------------------------------------------------------------
  private var nEvents = 0L

  /** Rough state-size model (paper's peak-memory metric; see Metrics). */
  private def currentBytes: Long = {
    var b = 0L
    qs.foreach { st =>
      b += (st.cumShared.size + st.blocked.size).toLong * nCh * 8 + nCh * 8L
      b += st.nodes.size.toLong * (48L + nCh * 8L)
    }
    shEvents.foreach { case (_, exprs) => b += 48L + exprs.map(_.size.toLong).sum * 16L }
    b += snapVals.size.toLong * k * nCh * 8L
    b
  }

  private def processBurst(typ: String, evs: IndexedSeq[Event]): Unit = {
    // Burst boundary: graphlets of all other types become inactive
    // (Definitions 6 and 10).
    if (shActive && !sharedType.contains(typ)) closeShared()

    if (sharedType.contains(typ) && k > 1) {
      metrics.totalBursts += 1
      val t0 = System.nanoTime()
      val dec = SharingOptimizer.decide(policy, evs, queries, typ, nEvents)
      metrics.decisions += 1
      metrics.decisionNanos += System.nanoTime() - t0
      metrics.plansExamined += dec.plansExamined
      if (dec.share) {
        metrics.sharedBursts += 1
        if (shActive) closeShared() // defensive: membership is per burst
        openShared(dec.sharedIdx, typ)
        val excluded = queries.indices.filterNot(dec.sharedIdx.contains)
        evs.foreach { e =>
          processShared(e, typ)
          excluded.foreach { i =>
            if (qs(i).tpl.types.contains(typ) && queries(i).q.matches(e)) processNS(qs(i), e)
          }
          nEvents += 1; metrics.events += 1
        }
      } else {
        if (shActive) closeShared()
        evs.foreach { e =>
          qs.foreach(st => if (st.tpl.types.contains(typ) && st.cq.q.matches(e)) processNS(st, e))
          nEvents += 1; metrics.events += 1
        }
      }
    } else {
      evs.foreach { e =>
        qs.foreach { st =>
          if (st.tpl.types.contains(typ) && st.cq.q.matches(e)) processNS(st, e)
          // Negation roles of this event for this query:
          if (st.tpl.trailingNegs.contains(typ) && st.cq.q.matches(e)) {
            // Pattern-final NOT: all trends ended so far are invalidated.
            java.util.Arrays.fill(st.finalAcc, 0.0)
            st.finalMin = Double.PositiveInfinity
            st.finalMax = Double.NegativeInfinity
          }
          st.barriers.foreach { case (bi, nb) =>
            if (nb.negType == typ && st.cq.q.matches(e)) {
              st.lastNeg(bi) = e.id
              nb.fromTypes.foreach { T =>
                st.blocked.update((bi, T),
                  st.cumShared.get(T).map(_.clone()).getOrElse(new Array[Double](nCh)))
                st.blockedAll.update((bi, T),
                  st.cumAll.get(T).map(_.clone()).getOrElse(new Array[Double](nCh)))
              }
            }
          }
        }
        nEvents += 1; metrics.events += 1
      }
    }
    metrics.observeBytes(currentBytes)
  }

  /** Process one pane's events (time-ordered) and return per-query
    * aggregates. Events whose type no query references are ignored and do
    * not end bursts.
    */
  def processPane(events: IterableOnce[Event]): Map[String, PaneAgg] = {
    val t0 = System.nanoTime()
    val it = events.iterator.filter(e => typeUniverse.contains(e.typ))
    var curTyp: String = null
    val cur = mutable.ArrayBuffer.empty[Event]
    it.foreach { e =>
      if (curTyp != null && e.typ != curTyp) {
        processBurst(curTyp, cur.toIndexedSeq)
        cur.clear()
      }
      curTyp = e.typ
      cur += e
    }
    if (curTyp != null) processBurst(curTyp, cur.toIndexedSeq)
    // Pane end: every graphlet completes (Definition 10).
    closeShared()
    metrics.observeBytes(currentBytes)
    metrics.wallNanos += System.nanoTime() - t0
    qs.map { st =>
      st.cq.id -> PaneAgg(
        c = st.finalAcc(ChC),
        n = if (st.nIdx >= 0) st.finalAcc(st.nIdx) else 0.0,
        s = if (st.sIdx >= 0) st.finalAcc(st.sIdx) else 0.0,
        mn = st.finalMin,
        mx = st.finalMax,
      )
    }.toMap
  }
}
