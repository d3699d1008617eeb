package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Incrementally maintained grouped aggregate: the reusable stateful
  * operator that realizes the paper's `group` (§5.3.2) on Catalyst.
  *
  * State is a DataFrame keyed by `groupCols` holding partial aggregates.
  * Each epoch's pre-aggregated delta is merged by union + re-aggregation;
  * `localCheckpoint` materializes the state and truncates lineage so plan
  * depth stays constant across epochs. Aggregation functions are restricted
  * to merge-able ones (`sum`, `min`, `max`, with counts as sums) over exact
  * integer columns so results are independent of merge order.
  */
final class IncrementalAgg(groupCols: Seq[String], aggs: Seq[(String, String)]) {

  private var state: Option[DataFrame] = None

  private def mergeExprs: Seq[Column] = aggs.map { case (c, fn) =>
    (fn match {
      case "sum" => sum(col(c))
      case "min" => min(col(c))
      case "max" => max(col(c))
      case other => throw new IllegalArgumentException(s"non-mergeable aggregate: $other")
    }).as(c)
  }

  private def aggregate(rows: DataFrame): DataFrame =
    if (groupCols.isEmpty) rows.agg(mergeExprs.head, mergeExprs.tail: _*)
    else rows.groupBy(groupCols.map(col): _*).agg(mergeExprs.head, mergeExprs.tail: _*)

  /** Merge one epoch's rows (columns: groupCols ++ agg input columns). */
  def merge(rows: DataFrame): Unit = {
    val partial = aggregate(rows)
    val next = state match {
      case None    => partial
      case Some(s) => aggregate(s.unionByName(partial))
    }
    state = Some(next.localCheckpoint(true))
  }

  /** Current state; `merge` must have run at least once (install does). */
  def snapshot: DataFrame =
    state.getOrElse(throw new IllegalStateException("IncrementalAgg not initialized"))

  def stateRows: Long = state.map(_.count()).getOrElse(0L)
}
