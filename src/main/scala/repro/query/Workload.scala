package repro.query

/** A query compiled against a workload: its template plus pane geometry
  * (window/slide expressed in panes of the workload-wide gcd pane).
  */
final case class CompiledQuery(
    q: TrendQuery,
    tpl: Template,
    windowPanes: Int,
    slidePanes: Int,
) {
  def id: String = q.id
}

/** A set of queries sharing one Kleene sub-pattern E+ (Definitions 4/5).
  *
  * @param sharedType the Kleene type E
  * @param queries    members Q_E (|Q_E| > 1)
  * @param channels   aggregate channels the shared graphlets must carry
  *                   ("C" trend count, "N" event count, "S:attr" sums)
  */
final case class SharableSet(
    sharedType: String,
    queries: Vector[CompiledQuery],
    channels: Vector[String],
) {
  /** Union of the member queries' type universes (burst boundaries). */
  val typeUniverse: Set[String] = queries.flatMap(_.tpl.typeUniverse).toSet
}

/** Compiled workload: sharable sets + queries processed alone. */
final case class CompiledWorkload(
    paneMs: Long,
    queries: Vector[CompiledQuery],
    sets: Vector[SharableSet],
    singletons: Vector[CompiledQuery],
) {
  def byId(id: String): CompiledQuery = queries.find(_.id == id).get
}

/** Workload analysis (§3.1): pane computation and sharable-set discovery. */
object Workload {

  private def gcd(a: Int, b: Int): Int = if (b == 0) a else gcd(b, a % b)

  /** Pane length = gcd of all window sizes and slides (in minutes). */
  def paneMinutes(qs: Seq[TrendQuery]): Int =
    qs.flatMap(q => Seq(q.window.windowMin, q.window.slideMin)).reduce(gcd)

  /** Channels required to evaluate an aggregate online. */
  def channelsOf(a: Agg): Seq[String] = a match {
    case Agg.CountStar    => Seq("C")
    case Agg.CountE(_)    => Seq("C", "N")
    case Agg.Sum(_, at)   => Seq("C", s"S:$at")
    case Agg.Avg(_, at)   => Seq("C", "N", s"S:$at")
    case Agg.Min(_, _) | Agg.Max(_, _) => Seq("C")
  }

  /** Compile a workload: templates, pane gcd, and sharable sets.
    *
    * Two queries are sharable (Def. 5) if they hold the same Kleene
    * sub-pattern E+, their aggregation share-classes match, their windows
    * overlap (always true for sliding windows over one stream), and their
    * grouping attributes are equal.
    */
  def compile(qs: Seq[TrendQuery]): CompiledWorkload = {
    require(qs.map(_.id).distinct.size == qs.size, "duplicate query ids")
    val paneMin = paneMinutes(qs)
    val paneMs  = paneMin * 60_000L
    val compiled = qs.toVector.map { q =>
      CompiledQuery(q, Template.compile(q),
        windowPanes = q.window.windowMin / paneMin,
        slidePanes  = q.window.slideMin / paneMin)
    }
    val sharable = compiled
      .flatMap { cq =>
        for {
          e   <- cq.q.pattern.kleeneTypes.headOption // one Kleene per query (§3 assumption)
          cls <- Agg.shareClass(cq.q.agg)
        } yield (e, cls, cq.q.groupBy) -> cq
      }
      .groupMap(_._1)(_._2)
      .collect { case ((e, _, _), members) if members.size > 1 =>
        SharableSet(e, members,
          members.flatMap(m => channelsOf(m.q.agg)).distinct.sorted)
      }
      .toVector
      .sortBy(_.sharedType)
    val inSets = sharable.flatMap(_.queries.map(_.id)).toSet
    CompiledWorkload(paneMs, compiled, sharable,
      singletons = compiled.filterNot(c => inSets(c.id)))
  }
}
