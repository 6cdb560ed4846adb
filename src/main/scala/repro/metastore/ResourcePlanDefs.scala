package repro.metastore

/** Resource-plan definitions for the LLAP workload manager (§5.2), persisted
  * in the metastore like Hive persists them in HMS.
  */

/** A pool of LLAP resources.
  *
  * @param name             pool name within its plan
  * @param allocFraction    guaranteed fraction of cluster executors (0..1]
  * @param queryParallelism max queries admitted concurrently to this pool
  */
final case class PoolDef(name: String, allocFraction: Double, queryParallelism: Int) {
  require(allocFraction > 0 && allocFraction <= 1.0, s"allocFraction out of range: $allocFraction")
  require(queryParallelism > 0, s"queryParallelism must be positive: $queryParallelism")
}

/** Routes incoming queries to pools based on query properties. */
sealed trait MappingDef { def pool: String }
/** Maps all queries fired by `user` to `pool`. */
final case class UserMapping(user: String, pool: String) extends MappingDef
/** Maps all queries fired by an application to `pool` (the paper's
  * `CREATE APPLICATION MAPPING visualization_app ... TO bi`). */
final case class ApplicationMapping(application: String, pool: String) extends MappingDef

/** Actions a trigger may take on a query based on runtime metrics. */
sealed trait TriggerAction
final case class MoveToPool(pool: String) extends TriggerAction
case object KillQuery extends TriggerAction

/** A trigger: when `metric` exceeds `threshold`, perform `action`.
  * Metrics are collected at runtime by the workload manager; the paper's
  * example is `WHEN total_runtime > 3000 THEN MOVE etl`. */
final case class TriggerDef(name: String, metric: String, threshold: Double, action: TriggerAction)

/** A complete self-contained resource-sharing configuration. */
final case class ResourcePlanDef(
    name: String,
    pools: Seq[PoolDef],
    mappings: Seq[MappingDef] = Seq.empty,
    triggers: Map[String, Seq[TriggerDef]] = Map.empty, // pool -> triggers added to it
    defaultPool: Option[String] = None) {

  require(pools.nonEmpty, "a resource plan needs at least one pool")
  require(pools.map(_.name).distinct.size == pools.size, "duplicate pool names")
  require(pools.map(_.allocFraction).sum <= 1.0 + 1e-9,
    s"pool allocations exceed the cluster: ${pools.map(_.allocFraction).sum}")
  require(defaultPool.forall(p => pools.exists(_.name == p)), s"unknown default pool: $defaultPool")
  require(mappings.forall(m => pools.exists(_.name == m.pool)), "mapping to unknown pool")

  def pool(name: String): PoolDef =
    pools.find(_.name == name).getOrElse(throw new NoSuchElementException(s"no such pool: $name"))

  /** Resolves the pool for a query by (application, user), falling back to
    * the plan's default pool. */
  def resolvePool(application: Option[String], user: Option[String]): Option[String] = {
    val byApp = application.flatMap(a => mappings.collectFirst { case ApplicationMapping(`a`, p) => p })
    val byUser = user.flatMap(u => mappings.collectFirst { case UserMapping(`u`, p) => p })
    byApp.orElse(byUser).orElse(defaultPool)
  }
}
