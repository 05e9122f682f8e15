package repro.hamlet

import repro.query.{Agg, CompiledQuery}

/** One aggregate channel carried by an engine.
  *
  * @param name    "C" (trend count), "N" (event count), or "S:attr"
  * @param injType event type whose events inject into this channel
  *                (None for "C" — every event's own count injects there)
  * @param attr    attribute summed by an "S:attr" channel
  */
final case class ChannelSpec(name: String, injType: Option[String], attr: Option[String])
    extends Serializable

object ChannelSpec {

  private def specsOf(a: Agg): Seq[ChannelSpec] = a match {
    case Agg.CountStar     => Nil
    case Agg.CountE(t)     => Seq(ChannelSpec("N", Some(t), None))
    case Agg.Sum(t, at)    => Seq(ChannelSpec(s"S:$at", Some(t), Some(at)))
    case Agg.Avg(t, at)    => Seq(ChannelSpec("N", Some(t), None), ChannelSpec(s"S:$at", Some(t), Some(at)))
    case Agg.Min(_, _) | Agg.Max(_, _) => Nil // tracked by dedicated min/max scalars
  }

  /** Channel layout for a set of queries executed by one engine: "C" first,
    * then the union of the members' channels. Within a sharable set the
    * injection types agree by construction (Agg.shareClass pins the type).
    */
  def forQueries(qs: Seq[CompiledQuery]): Vector[ChannelSpec] = {
    val extra = qs.flatMap(q => specsOf(q.q.agg)).distinct
    val byName = extra.groupBy(_.name)
    byName.foreach { case (n, ss) =>
      require(ss.map(_.injType).distinct.size == 1,
        s"conflicting injection types for channel $n: $ss")
    }
    (ChannelSpec("C", None, None) +: byName.values.map(_.head).toVector.sortBy(_.name))
  }
}
