package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.repro.PlanUtils
import org.apache.spark.sql.catalyst.expressions.Alias
import org.apache.spark.sql.catalyst.plans.logical.{LocalRelation, LogicalPlan, Project}
import org.apache.spark.sql.catalyst.rules.Rule

/** Shared work optimization (§4.5).
  *
  * Identifies semantically equal subexpressions inside one query plan and
  * evaluates them once, substituting every occurrence with a reference to
  * the shared result. Like Hive's reuse-based optimizer it does NOT search
  * the space of equivalent plans — it only merges subtrees that are already
  * equal (canonicalized), keeping optimization overhead negligible. The
  * shared edge is realized by persisting the common sub-DataFrame, letting
  * the engine (Spark's cache manager) decide the transfer/storage strategy,
  * as Hive leaves that decision to Tez.
  */
final class SharedWorkRule(spark: SparkSession) extends Rule[LogicalPlan] {

  /** Number of subplans merged by the last apply() — observability hook. */
  @volatile var lastShared: Int = 0

  override def apply(plan: LogicalPlan): LogicalPlan = {
    lastShared = 0

    // count occurrences of every canonicalized subtree (ignore leaves of
    // size 1 that are trivial, e.g. LocalRelation literals). Wrapper nodes
    // whose canonical form equals their child's (SubqueryAlias, View) are
    // skipped — counting them would see one occurrence several times.
    def isWrapper(p: LogicalPlan): Boolean =
      p.children.size == 1 && p.canonicalized == p.children.head.canonicalized
    val counts = scala.collection.mutable.Map[LogicalPlan, Int]()
    plan.foreach { p =>
      val size = p.collect { case _ => 1 }.sum
      if (size >= 2 && p.resolved && !p.isInstanceOf[LocalRelation] && !isWrapper(p))
        counts.updateWith(p.canonicalized) { c => Some(c.getOrElse(0) + 1) }
    }
    val repeated = counts.filter(_._2 >= 2).keySet
    if (repeated.isEmpty) return plan

    // choose maximal repeated subtrees top-down: once a subtree is shared,
    // its descendants are covered by it
    val chosen = scala.collection.mutable.Map[LogicalPlan, LogicalPlan]() // canonical -> shared plan
    def pick(p: LogicalPlan): Unit = {
      if (repeated.contains(p.canonicalized)) {
        if (!chosen.contains(p.canonicalized)) {
          val shared = PlanUtils.ofRows(spark, p)
          shared.persist()
          chosen(p.canonicalized) = shared.queryExecution.analyzed
          lastShared += 1
        }
      } else p.children.foreach(pick)
    }
    pick(plan)
    if (chosen.isEmpty) return plan

    // substitute every occurrence; keep the original output attribute ids
    // alive through a renaming projection so parents stay resolved. Manual
    // recursion: a substituted subtree is NOT descended into (it contains
    // the shared plan itself, which would match again forever).
    def substitute(p: LogicalPlan): LogicalPlan =
      if (chosen.contains(p.canonicalized)) {
        val shared = chosen(p.canonicalized)
        if (p.output.map(_.exprId) == shared.output.map(_.exprId)) shared
        else {
          val aliases = p.output.zip(shared.output).map { case (oldA, newA) =>
            Alias(newA, oldA.name)(exprId = oldA.exprId)
          }
          Project(aliases, shared)
        }
      } else if (p.children.isEmpty) p
      else p.withNewChildren(p.children.map(substitute))

    substitute(plan)
  }
}

object SharedWork {
  final case class Result(df: DataFrame, sharedSubplans: Int)

  /** Applies the rule just before execution, as Hive does. */
  def optimize(spark: SparkSession, df: DataFrame): Result = {
    val rule = new SharedWorkRule(spark)
    val newPlan = rule.apply(df.queryExecution.analyzed)
    Result(PlanUtils.ofRows(spark, newPlan), rule.lastShared)
  }
}
