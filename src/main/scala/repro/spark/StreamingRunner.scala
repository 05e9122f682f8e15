package repro.spark

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}

import repro.core.PaneResult
import repro.events.Event
import repro.hamlet.{HamletExecutor, SharingPolicy}
import repro.metrics.Metrics
import repro.query.CompiledWorkload

/** Structured Streaming execution: the Hamlet executor as a *stateful
  * operator* (`flatMapGroupsWithState`), with the dynamic sharing plan
  * (re)selected per burst inside every micro-batch — the mapping called
  * for by the reproduction brief.
  *
  * State per group: the events of the newest, still-open pane. Whenever a
  * micro-batch shows events of a later pane, every completed pane is run
  * through the [[HamletExecutor]] (graphlets, snapshots, per-burst
  * decisions) and its results are appended downstream. A sentinel event
  * (type [[StreamingRunner.FlushType]], one per group, with a timestamp
  * past the last pane) flushes the final pane at end of input.
  */
object StreamingRunner {

  /** Sentinel type that closes all open panes of its group. */
  val FlushType = "__flush__"

  def flushEvents(groups: Seq[String], afterTs: Long): Seq[Event] =
    groups.zipWithIndex.map { case (g, i) =>
      Event(Long.MaxValue - i, afterTs, FlushType, g)
    }

  /** Per-group state: events buffered for the newest open pane. */
  final case class GroupBuf(pane: Long, events: List[Event])

  def run(
      spark: SparkSession,
      wl: CompiledWorkload,
      policy: SharingPolicy,
      events: Dataset[Event],
  ): Dataset[PaneResult] = {
    import spark.implicits._
    val exec = new HamletExecutor(wl, policy)
    val paneMs = wl.paneMs

    def process(
        grp: String,
        it: Iterator[Event],
        state: GroupState[GroupBuf],
    ): Iterator[PaneResult] = {
      val incoming = it.toArray.sortBy(e => (e.ts, e.id))
      val prev = state.getOption.getOrElse(GroupBuf(-1L, Nil))
      val flush = incoming.exists(_.typ == FlushType)
      val evs = (prev.events.reverse ++ incoming.filterNot(_.typ == FlushType))
      if (evs.isEmpty && !flush) return Iterator.empty
      val metrics = new Metrics
      val byPane = evs.groupBy(_.pane(paneMs)).toSeq.sortBy(_._1)
      val newest = byPane.lastOption.map(_._1).getOrElse(-1L)
      val (done, open) =
        if (flush) (byPane, Nil)
        else byPane.partition(_._1 < newest)
      val out = done.flatMap { case (pane, pevs) =>
        exec.processPane(grp, pane, pevs.toSeq, metrics)
      }
      if (flush) state.remove()
      else state.update(GroupBuf(newest, open.flatMap(_._2).reverse.toList))
      out.iterator
    }

    events
      .groupByKey(_.grp)
      .flatMapGroupsWithState[GroupBuf, PaneResult](
        OutputMode.Append, GroupStateTimeout.NoTimeout)(process)
  }
}
