package org.apache.spark.sql.repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan
import org.apache.spark.sql.classic.{Dataset, SparkSession => ClassicSession}

/** Bridge into Spark's `private[sql]` plan-to-DataFrame constructor. Rules
  * that rewrite analyzed plans (MV substitution, shared work) need to wrap
  * the rewritten LogicalPlan back into a DataFrame; this is the supported
  * extension-shim pattern for that. */
object PlanUtils {
  def ofRows(spark: SparkSession, plan: LogicalPlan): DataFrame =
    Dataset.ofRows(spark.asInstanceOf[ClassicSession], plan)
}
