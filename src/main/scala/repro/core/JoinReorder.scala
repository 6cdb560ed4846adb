package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.col

import repro.metastore.{Catalog, TableStats}

/** Cost model over HMS statistics (§4.1): cardinalities after filters via
  * column range/equality selectivity, join sizes via the NDV-containment
  * estimate |A ⋈ B| = |A|·|B| / max(ndv_A(k), ndv_B(k)). */
object CostModel {

  /** Estimated cardinality of `table` after applying `preds`. */
  def filteredCardinality(stats: TableStats, preds: Seq[Pred]): Double = {
    val sel = preds.map {
      case RangePred(c, lo, _, hi, _) =>
        stats.columns.get(c).map(_.rangeSelectivity(lo, hi)).getOrElse(0.5)
      case InPred(c, vs) =>
        stats.columns.get(c).map(s => math.min(1.0, vs.size * s.equalitySelectivity)).getOrElse(0.3)
      case EqStrPred(c, _) =>
        stats.columns.get(c).map(_.equalitySelectivity).getOrElse(0.1)
      case InStrPred(c, vs) =>
        stats.columns.get(c).map(s => math.min(1.0, vs.size * s.equalitySelectivity)).getOrElse(0.3)
    }.product
    math.max(1.0, stats.rowCount * sel)
  }

  /** Join size estimate using distinct-value containment. */
  def joinCardinality(leftRows: Double, rightRows: Double,
                      leftNdv: Long, rightNdv: Long): Double = {
    val d = math.max(math.max(leftNdv, rightNdv), 1L)
    math.max(1.0, leftRows * rightRows / d)
  }
}

/** Greedy cost-based join reordering, standing in for the Calcite join
  * reordering rules Hive enables (§4.1). Starts from the smallest filtered
  * relation and repeatedly joins the connected relation that minimizes the
  * estimated intermediate size. */
object JoinReorder {

  final case class Plan(order: Seq[String], estimatedRows: Seq[Double])

  /** Chooses a join order for `q` using statistics from `catalog`. */
  def plan(q: SpjaQuery, catalog: Catalog): Plan = {
    val stats: Map[String, TableStats] = q.tables.map { t =>
      t -> catalog.statsOf(t).getOrElse(TableStats(1000000L, Map.empty))
    }.toMap
    val owner: Map[String, String] = stats.flatMap { case (t, s) => s.columns.keys.map(_ -> t) }
    def predsOf(t: String): Seq[Pred] =
      q.preds.filter(p => owner.get(p.column).contains(t))
    val filtered: Map[String, Double] =
      q.tables.map(t => t -> CostModel.filteredCardinality(stats(t), predsOf(t))).toMap

    def connected(t: String, included: Set[String]): Boolean =
      q.joins.exists { case (a, b) =>
        (owner.get(a).contains(t) && owner.get(b).exists(included.contains)) ||
          (owner.get(b).contains(t) && owner.get(a).exists(included.contains))
      }
    def joinNdv(t: String, included: Set[String]): (Long, Long) = {
      val cond = q.joins.find { case (a, b) =>
        (owner.get(a).contains(t) && owner.get(b).exists(included.contains)) ||
          (owner.get(b).contains(t) && owner.get(a).exists(included.contains))
      }.getOrElse(return (1L, 1L))
      val (a, b) = cond
      val (tCol, oCol) = if (owner.get(a).contains(t)) (a, b) else (b, a)
      val tNdv = stats(t).columns.get(tCol).map(_.ndv).getOrElse(1000L)
      val oNdv = owner.get(oCol).flatMap(o => stats(o).columns.get(oCol).map(_.ndv)).getOrElse(1000L)
      (tNdv, oNdv)
    }

    val start = q.tables.minBy(filtered)
    var order = Vector(start)
    var included = Set(start)
    var size = filtered(start)
    var sizes = Vector(size)
    while (included.size < q.tables.size) {
      val candidates = (q.tables -- included).filter(connected(_, included))
      val pool = if (candidates.nonEmpty) candidates else q.tables -- included // cross join fallback
      val next = pool.minBy { t =>
        val (tN, oN) = joinNdv(t, included)
        CostModel.joinCardinality(size, filtered(t), tN, oN)
      }
      val (tN, oN) = joinNdv(next, included)
      size = CostModel.joinCardinality(size, filtered(next), tN, oN)
      order :+= next
      sizes :+= size
      included += next
    }
    Plan(order, sizes)
  }

  /** Builds the joined DataFrame following a chosen order. */
  def build(spark: SparkSession, q: SpjaQuery, order: Seq[String]): DataFrame = {
    val owner: Map[String, String] = q.tables.flatMap { t =>
      spark.table(t).columns.map(_ -> t)
    }.toMap
    order.tail.foldLeft(spark.table(order.head) -> Set(order.head)) {
      case ((df, included), t) =>
        val conds = q.joins.toSeq.filter { case (a, b) =>
          (owner.get(a).contains(t) && owner.get(b).exists(included.contains)) ||
            (owner.get(b).contains(t) && owner.get(a).exists(included.contains))
        }.map { case (a, b) => col(a) === col(b) }
        val joined =
          if (conds.nonEmpty) df.join(spark.table(t), conds.reduce(_ && _))
          else df.crossJoin(spark.table(t))
        joined -> (included + t)
    }._1
  }
}
