package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.execution.SparkPlan
import org.apache.spark.sql.functions._

/** Runtime operator statistics (§4.2): after execution, per-operator output
  * row counts are harvested from the executed plan's metrics — the feedback
  * the reoptimizer (and, in Hive's roadmap, the optimizer itself) uses. */
object RuntimeStats {

  /** Collects `numOutputRows` per physical operator of an executed query.
    * Keys are `nodeName#id`. Call after an action has run. */
  def collect(df: DataFrame): Map[String, Long] = {
    import org.apache.spark.sql.execution.adaptive.{AdaptiveSparkPlanExec, QueryStageExec}
    def walk(p: SparkPlan): Seq[(String, Long)] = {
      val here = p.metrics.get("numOutputRows")
        .map(m => s"${p.nodeName}#${p.id}" -> m.value).toSeq
      val kids = p match {
        case a: AdaptiveSparkPlanExec => Seq(a.executedPlan)
        case s: QueryStageExec        => Seq(s.plan)
        case other                    => other.children
      }
      here ++ kids.flatMap(walk)
    }
    walk(df.queryExecution.executedPlan).toMap
  }

  /** Total rows produced by operators whose name matches `pattern`. */
  def rowsFor(stats: Map[String, Long], pattern: String): Long =
    stats.collect { case (k, v) if k.toLowerCase.contains(pattern.toLowerCase) => v }.sum
}

/** Query reoptimization (§4.2): two independent strategies.
  *
  *   - **overlay** — on any execution error, re-execute with a fixed set of
  *     configuration overrides known to make execution robust (e.g. force
  *     the shuffle join algorithm for every join).
  *   - **reoptimize** — capture runtime statistics from the failed run and
  *     re-plan with them; here, the planner's join-algorithm choice
  *     (broadcast vs shuffle) is re-made with actual instead of estimated
  *     cardinalities.
  *
  * The simulated failure mode mirrors the paper's example of a planning
  * mistake: a join side whose estimated cardinality selected a broadcast
  * join, whose actual cardinality exceeds the broadcast memory limit.
  */
object Reoptimizer {
  sealed trait Strategy
  case object Overlay extends Strategy
  case object ReoptimizeWithStats extends Strategy

  final case class AttemptLog(algorithm: String, failed: Boolean, buildRows: Option[Long])
  final case class Outcome(df: DataFrame, attempts: Seq[AttemptLog])

  /** Thrown when a broadcast build side exceeds the memory limit. */
  final class BroadcastOverflowException(rows: Long, limit: Long) extends RuntimeException(
    s"broadcast build side has $rows rows > hard limit $limit")
}

final class Reoptimizer(
    broadcastThresholdRows: Long,
    broadcastHardLimitRows: Long) {
  require(broadcastHardLimitRows >= broadcastThresholdRows)
  import Reoptimizer._

  /** Plans and executes `left join right`, choosing the join algorithm from
    * `estimatedRightRows`; on broadcast overflow, re-executes per the
    * chosen reoptimization strategy. Returns the final result (already
    * materialized) and the attempt log. */
  def executeJoin(
      left: DataFrame,
      right: DataFrame,
      condition: Column,
      estimatedRightRows: Long,
      strategy: Strategy): Outcome = {
    val attempts = Seq.newBuilder[AttemptLog]

    def run(algorithm: String): DataFrame = {
      val r = algorithm match {
        case "broadcast" =>
          // validate the planner's assumption at runtime, like a broadcast
          // build blowing past its memory reservation
          val actual = right.count()
          if (actual > broadcastHardLimitRows) {
            attempts += AttemptLog("broadcast", failed = true, Some(actual))
            throw new BroadcastOverflowException(actual, broadcastHardLimitRows)
          }
          left.join(broadcast(right), condition)
        case "shuffle" =>
          left.join(right.hint("shuffle_hash"), condition)
      }
      r.cache().count() // execute
      attempts += AttemptLog(algorithm, failed = false, None)
      r
    }

    val planned = if (estimatedRightRows <= broadcastThresholdRows) "broadcast" else "shuffle"
    try Outcome(run(planned), attempts.result())
    catch {
      case _: BroadcastOverflowException =>
        strategy match {
          case Overlay =>
            // overlay: force the robust algorithm for all re-executions
            Outcome(run("shuffle"), attempts.result())
          case ReoptimizeWithStats =>
            // re-plan with the runtime statistic captured from the failure
            val actual = attempts.result().last.buildRows.get
            val replanned = if (actual <= broadcastThresholdRows) "broadcast" else "shuffle"
            Outcome(run(replanned), attempts.result())
        }
    }
  }
}
