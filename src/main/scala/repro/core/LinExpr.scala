package repro.core

/** A linear expression over snapshot values:
  * `const + Σ coef_i · value(snap_i, channel_i, q)`.
  *
  * Intermediate trend aggregates of events in *shared* graphlets are such
  * expressions (§3.3, data structure (2): "hash table of snapshot
  * coefficients per event" — e.g. `count(b6, Q) = 4x + z`). The expression
  * is query-independent; per-query values are obtained by substituting the
  * per-query snapshot values from the snapshot table.
  *
  * Terms are keyed by a packed (snapshotId, channelIndex) — see
  * [[LinExpr.key]] — because e.g. a sum-channel expression references the
  * count-channel value of a snapshot (`s(e) = Σ s(e') + attr·c(e)`).
  */
final case class LinExpr(const: Double, terms: Map[Long, Double]) {

  def +(o: LinExpr): LinExpr =
    LinExpr(const + o.const,
      o.terms.foldLeft(terms) { case (m, (k, v)) =>
        m.updated(k, m.getOrElse(k, 0.0) + v)
      })

  def *(a: Double): LinExpr =
    if (a == 0.0) LinExpr.zero
    else LinExpr(const * a, terms.view.mapValues(_ * a).toMap)

  def +(c: Double): LinExpr = LinExpr(const + c, terms)

  /** Number of snapshot terms — the `s_p` factor of the cost model. */
  def size: Int = terms.size

  /** Substitute per-query snapshot values. `lookup(snapId, chIdx)` returns
    * the value of that snapshot channel for the query being evaluated.
    */
  def eval(lookup: (Long, Int) => Double): Double = {
    var acc = const
    terms.foreach { case (k, coef) =>
      acc += coef * lookup(LinExpr.snapOf(k), LinExpr.chanOf(k))
    }
    acc
  }
}

object LinExpr {
  val zero: LinExpr = LinExpr(0.0, Map.empty)

  /** Expression that is exactly one snapshot channel. */
  def ofSnap(snapId: Long, chIdx: Int): LinExpr =
    LinExpr(0.0, Map(key(snapId, chIdx) -> 1.0))

  def const(c: Double): LinExpr = LinExpr(c, Map.empty)

  /** Pack (snapshot id, channel index); engines use < 8 channels. */
  def key(snapId: Long, chIdx: Int): Long = {
    require(chIdx >= 0 && chIdx < 8, s"channel index $chIdx out of range")
    (snapId << 3) | chIdx.toLong
  }
  def snapOf(key: Long): Long = key >>> 3
  def chanOf(key: Long): Int  = (key & 7L).toInt
}
