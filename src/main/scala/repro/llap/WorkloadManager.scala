package repro.llap

import scala.collection.mutable

import repro.metastore.{KillQuery, MoveToPool, ResourcePlanDef}

/** Outcome of asking the workload manager to admit a query. */
sealed trait Admission
final case class Admitted(pool: String, borrowedFrom: Option[String] = None) extends Admission
case object Queued extends Admission

/** Action taken by a trigger on a running query. */
sealed trait TriggerOutcome
final case class Moved(from: String, to: String) extends TriggerOutcome
case object Killed extends TriggerOutcome
case object NoAction extends TriggerOutcome

/** The LLAP workload manager (§5.2).
  *
  * Enforces the active resource plan: routes queries to pools via mappings,
  * limits per-pool concurrency (`query_parallelism`), lends idle capacity
  * of other pools to over-subscribed ones (reclaimed when the owning pool
  * needs it is approximated by first-come-first-served release), and fires
  * triggers on runtime metrics to move or kill queries.
  */
final class WorkloadManager(val plan: ResourcePlanDef) {

  private final case class Running(queryId: String, var pool: String, var borrowedFrom: Option[String])

  private val running = mutable.Map[String, Running]()
  private val waiting = mutable.Queue[(String, String)]() // (queryId, pool)
  private val killed = mutable.Set[String]()

  private def slotsUsed(pool: String): Int = synchronized {
    running.values.count(r => r.borrowedFrom.getOrElse(r.pool) == pool)
  }

  private def hasIdle(pool: String): Boolean =
    slotsUsed(pool) < plan.pool(pool).queryParallelism

  /** Admits a query, routing it via the plan's mappings. */
  def admit(queryId: String, application: Option[String] = None,
            user: Option[String] = None): Admission = synchronized {
    val pool = plan.resolvePool(application, user).getOrElse(
      throw new IllegalStateException(s"no pool resolves for query $queryId and the plan has no default"))
    if (hasIdle(pool)) {
      running(queryId) = Running(queryId, pool, None)
      Admitted(pool)
    } else {
      // a query may be assigned idle resources from a pool it is not mapped
      // to, until a query of that pool claims them (§5.2)
      plan.pools.map(_.name).filterNot(_ == pool).find(hasIdle) match {
        case Some(idlePool) =>
          running(queryId) = Running(queryId, pool, Some(idlePool))
          Admitted(pool, borrowedFrom = Some(idlePool))
        case None =>
          waiting.enqueue((queryId, pool))
          Queued
      }
    }
  }

  /** Reports a runtime metric for a query; fires matching triggers of the
    * query's current pool. Returns the outcome (move/kill/none). */
  def reportMetric(queryId: String, metric: String, value: Double): TriggerOutcome = synchronized {
    val r = running.getOrElse(queryId, return NoAction)
    val triggers = plan.triggers.getOrElse(r.pool, Seq.empty)
    triggers.find(t => t.metric == metric && value > t.threshold) match {
      case Some(t) => t.action match {
        case MoveToPool(to) =>
          val from = r.pool
          r.pool = to
          // the slot it physically occupies moves too when the target has room
          if (slotsUsed(to) <= plan.pool(to).queryParallelism) r.borrowedFrom = None
          Moved(from, to)
        case KillQuery =>
          running.remove(queryId)
          killed += queryId
          admitFromQueue()
          Killed
      }
      case None => NoAction
    }
  }

  /** Releases a finished query's slot and admits a waiter if possible. */
  def release(queryId: String): Unit = synchronized {
    running.remove(queryId)
    admitFromQueue()
  }

  private def admitFromQueue(): Unit = {
    val admittable = waiting.dequeueFirst { case (_, pool) => hasIdle(pool) }
    admittable.foreach { case (q, pool) => running(q) = Running(q, pool, None) }
  }

  def poolOf(queryId: String): Option[String] = synchronized(running.get(queryId).map(_.pool))
  def isQueued(queryId: String): Boolean = synchronized(waiting.exists(_._1 == queryId))
  def isKilled(queryId: String): Boolean = synchronized(killed.contains(queryId))
  def runningCount: Int = synchronized(running.size)
}
