package repro.testkit

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.events.Event
import repro.query.{CompiledQuery, NumPred, Pred, StrPred}

/** Builds the DuckDB side of the trend-count oracle: trend counting as
  * recursive path counting over the match DAG (every `UNION ALL` row is one
  * distinct trend prefix), with predicates and negation expressed in SQL —
  * an evaluation path fully independent of the Scala engines. Used through
  * `repro.Oracle.assertEquivalent`.
  */
object TrendSql {

  /** Events as a flat DataFrame: id, ts, pane, typ, grp + one column per
    * numeric/string attribute in `numAttrs`/`strAttrs`.
    */
  def eventsDf(spark: SparkSession, events: Seq[Event], paneMs: Long,
               numAttrs: Seq[String] = Nil, strAttrs: Seq[String] = Nil): DataFrame = {
    import spark.implicits._
    val rows = events.map { e =>
      (e.id, e.ts, e.pane(paneMs), e.typ, e.grp,
        numAttrs.map(a => e.num.get(a).map(_.toString).orNull),
        strAttrs.map(a => e.str.get(a).orNull))
    }
    val base = rows.map { case (id, ts, pane, typ, grp, ns, ss) =>
      (id, ts, pane, typ, grp, ns ++ ss)
    }.toDF("id", "ts", "pane", "typ", "grp", "extra")
    (numAttrs ++ strAttrs).zipWithIndex
      .foldLeft(base) { case (df, (a, i)) =>
        df.withColumn(a, org.apache.spark.sql.functions.col("extra").getItem(i))
      }
      .drop("extra")
  }

  def transitionsDf(spark: SparkSession, q: CompiledQuery): DataFrame = {
    import spark.implicits._
    q.tpl.transitions.toSeq.toDF("ft", "tt")
  }

  private def sqlStr(s: String): String = "'" + s.replace("'", "''") + "'"
  private def inList(ts: Iterable[String]): String = ts.map(sqlStr).mkString("(", ", ", ")")

  /** Predicate conjunction of the query applied to table alias `a`. */
  private def predSql(preds: Seq[Pred], a: String): String = {
    val cs = preds.map {
      case NumPred(t, attr, op, v) =>
        val o = if (op == "=") "=" else if (op == "!=") "<>" else op
        s"($a.typ <> ${sqlStr(t)} OR ($a.$attr IS NOT NULL AND CAST($a.$attr AS DOUBLE) $o $v))"
      case StrPred(t, attr, v) =>
        s"($a.typ <> ${sqlStr(t)} OR $a.$attr = ${sqlStr(v)})"
    }
    if (cs.isEmpty) "TRUE" else cs.mkString("(", " AND ", ")")
  }

  /** Recursive-CTE SQL computing per-(grp, pane) trend counts of `q` over
    * tables `events` and `trans`. Output columns: grp, pane, c.
    */
  def countSql(q: CompiledQuery): String = {
    require(q.q.edgePred.isEmpty, "edge predicates are not expressible in the SQL oracle")
    val tpl = q.tpl
    val midNegSql = tpl.midNegs.map { nb =>
      s"""AND NOT (p.last_typ IN ${inList(nb.fromTypes)} AND e.typ IN ${inList(nb.toTypes)}
         |  AND EXISTS (SELECT 1 FROM events nx
         |              WHERE nx.grp = e.grp AND nx.pane = e.pane
         |                AND nx.typ = ${sqlStr(nb.negType)}
         |                AND ${predSql(q.q.preds, "nx")}
         |                AND CAST(nx.id AS BIGINT) > p.last_id
         |                AND CAST(nx.id AS BIGINT) < CAST(e.id AS BIGINT)))""".stripMargin
    }.mkString("\n")
    val trailSql =
      if (tpl.trailingNegs.isEmpty) ""
      else
        s"""AND NOT EXISTS (SELECT 1 FROM events nx
           |  WHERE nx.grp = p.grp AND nx.pane = p.pane
           |    AND nx.typ IN ${inList(tpl.trailingNegs)}
           |    AND ${predSql(q.q.preds, "nx")}
           |    AND CAST(nx.id AS BIGINT) > p.last_id)""".stripMargin
    s"""WITH RECURSIVE paths AS (
       |  SELECT CAST(id AS BIGINT) AS last_id, typ AS last_typ, grp, pane
       |  FROM events
       |  WHERE typ IN ${inList(tpl.startTypes)} AND ${predSql(q.q.preds, "events")}
       |  UNION ALL
       |  SELECT CAST(e.id AS BIGINT), e.typ, e.grp, e.pane
       |  FROM paths p
       |  JOIN events e ON e.grp = p.grp AND e.pane = p.pane
       |  JOIN trans t ON t.ft = p.last_typ AND t.tt = e.typ
       |  WHERE CAST(e.id AS BIGINT) > p.last_id
       |    AND ${predSql(q.q.preds, "e")}
       |    $midNegSql
       |)
       |SELECT grp, pane, CAST(COUNT(*) AS DOUBLE) AS c
       |FROM paths p
       |WHERE last_typ IN ${inList(tpl.endTypes)}
       |  $trailSql
       |GROUP BY grp, pane""".stripMargin
  }
}
