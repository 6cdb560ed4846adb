package repro.core

import scala.collection.concurrent.TrieMap

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.catalyst.{expressions, plans}
import org.apache.spark.sql.catalyst.plans.logical
import org.apache.spark.sql.functions._

/** A registered materialized view: its SPJA definition and the temp view
  * holding the materialized contents ("just semantically enriched tables"). */
final case class MaterializedView(name: String, query: SpjaQuery, sql: String)

/** Registry of source tables and materialized views (HMS-side state). */
final class MvCatalog(spark: SparkSession) {
  private val sources = TrieMap[String, Unit]()
  private val dimensions = TrieMap[String, Unit]()
  private val views = TrieMap[String, MaterializedView]()

  /** Declares a temp view as a rewriting-eligible source table. */
  def registerSource(name: String): Unit = {
    require(spark.catalog.tableExists(name), s"no such view/table: $name")
    sources.put(name, ()): Unit
  }

  /** Declares a source as a PK-complete dimension: joining it through its
    * key neither drops nor duplicates fact rows. This is the integrity-
    * constraint information (PK/FK/NOT NULL) the rewriting algorithm
    * exploits (§4.4) to use an MV that joins *more* tables than the query. */
  def registerDimension(name: String): Unit = {
    registerSource(name)
    dimensions.put(name, ()): Unit
  }

  def isKeyPreservingDimension(name: String): Boolean = dimensions.contains(name)

  def sourceNames: Set[String] = sources.keySet.toSet

  /** CREATE MATERIALIZED VIEW name AS sql — materializes the contents into
    * a cached temp view and registers the SPJA definition for rewriting. */
  def createMaterializedView(name: String, sql: String): MaterializedView = {
    val df = spark.sql(sql)
    val q = Spja.extract(df.queryExecution.analyzed, sourceNames).getOrElse(
      throw new IllegalArgumentException(
        s"materialized view $name is not a supported SPJA expression"))
    df.cache().createOrReplaceTempView(name)
    df.count() // force materialization
    val mv = MaterializedView(name, q, sql)
    views.put(name, mv)
    mv
  }

  /** Registers an MV whose contents are stored in an *external* system
    * (§6): the temp view `name` (e.g. a Druid-backed scan) must already
    * exist; only the SPJA definition is recorded for rewriting. This is
    * the "materialized view stored in Druid" path of the federation
    * experiment. */
  def registerExternalMaterializedView(name: String, sql: String): MaterializedView = {
    require(spark.catalog.tableExists(name), s"external MV view missing: $name")
    val q = Spja.extract(spark.sql(sql).queryExecution.analyzed, sourceNames).getOrElse(
      throw new IllegalArgumentException(
        s"materialized view $name is not a supported SPJA expression"))
    val mv = MaterializedView(name, q, sql)
    views.put(name, mv)
    mv
  }

  /** Full rebuild (REBUILD statement): rerun the definition. */
  def rebuildFull(name: String): Unit = {
    val mv = views.getOrElse(name, throw new NoSuchElementException(s"no such MV: $name"))
    spark.catalog.dropTempView(name)
    val df = spark.sql(mv.sql)
    df.cache().createOrReplaceTempView(name)
    df.count(): Unit
  }

  def drop(name: String): Unit = {
    views.remove(name)
    spark.catalog.dropTempView(name): Unit
  }

  def list: Seq[MaterializedView] = views.values.toSeq.sortBy(_.name)
}

/** Automatic query rewriting over materialized views (§4.4).
  *
  * Produces *fully contained* rewrites (the query reads only the MV) and
  * *partially contained* rewrites (a UNION ALL of the MV and the missing
  * slice recomputed from the source tables — Figure 4c). Containment is
  * decided over the SPJA normal form with per-column domain implication.
  */
object MvRewriter {

  sealed trait Kind
  case object FullContainment extends Kind
  case object PartialContainment extends Kind

  final case class Rewrite(df: DataFrame, view: String, kind: Kind)

  /** Attempts to rewrite `df` over any registered MV; first match wins
    * (cost-based selection among multiple candidates is approximated by
    * preferring full containment over partial). ORDER BY / LIMIT on top of
    * the SPJA core are peeled off and re-applied to the rewritten plan. */
  def rewrite(spark: SparkSession, df: DataFrame, catalog: MvCatalog): Option[Rewrite] = {
    val (core, post) = peel(df.queryExecution.analyzed)
    val q = Spja.extract(core, catalog.sourceNames).getOrElse(return None)
    val candidates = catalog.list
    candidates.flatMap(v => tryFull(spark, q, v, Some(catalog))
        .map(d => Rewrite(post(d), v.name, FullContainment)))
      .headOption
      .orElse(candidates.flatMap(v => tryPartial(spark, q, v, catalog)
        .map(d => Rewrite(post(d), v.name, PartialContainment))).headOption)
  }

  /** Strips top-level Sort / Limit, returning the inner plan and a function
    * re-applying the stripped modifiers to the rewritten DataFrame. */
  private def peel(plan: logical.LogicalPlan): (logical.LogicalPlan, DataFrame => DataFrame) =
    plan match {
      case logical.GlobalLimit(expressions.Literal(n: Int, _), logical.LocalLimit(_, child)) =>
        val (inner, f) = peel(child)
        (inner, df => f(df).limit(n))
      case logical.Sort(orders, true, child, _) =>
        val cols = orders.map { so =>
          so.child match {
            case a: expressions.AttributeReference =>
              val c = col(a.name)
              if (so.direction == expressions.Descending) c.desc else c.asc
            case _ => return (plan, identity)
          }
        }
        val (inner, f) = peel(child)
        (inner, df => f(df).orderBy(cols: _*))
      case other => (other, identity)
    }

  // ------------------------------------------------------------------ full

  private[core] def tryFull(spark: SparkSession, q: SpjaQuery, v: MaterializedView,
                            catalog: Option[MvCatalog] = None): Option[DataFrame] = {
    val qD = Dom.ofPreds(q.preds).getOrElse(return None)
    tryFullWithDoms(spark, q, qD, v, catalog)
  }

  private def tryFullWithDoms(spark: SparkSession, q: SpjaQuery,
                              qD: Map[String, Dom], v: MaterializedView,
                              catalog: Option[MvCatalog] = None): Option[DataFrame] = {
    val vq = v.query
    // Exact table/join match, or — with constraint information — the view
    // may join additional key-preserving dimensions the query does not use.
    if (q.tables != vq.tables || q.joins != vq.joins) {
      val extraOk = catalog.exists { c =>
        q.tables.subsetOf(vq.tables) &&
          (vq.tables -- q.tables).forall(c.isKeyPreservingDimension) &&
          q.joins.subsetOf(vq.joins)
      }
      if (!extraOk) return None
    }
    val vD = Dom.ofPreds(vq.preds).getOrElse(return None)

    // every view constraint must be implied by the query
    vD.foreach { case (c, vd) =>
      val qd = qD.getOrElse(c, return None)
      if (!qd.implies(vd)) return None
    }

    // compensation: query constraints tighter than (or absent from) the view
    val compCols = qD.keys.filter(c => !vD.get(c).contains(qD(c))).toSeq.sorted
    def mvName(c: String): Option[String] =
      if (vq.isAggregate) vq.groupOut.find(_._1.column == c).map(_._2)
      else vq.projection.find(_._1.column == c).map(_._2)
    val comp: Seq[Column] = compCols.map { c =>
      val n = mvName(c).getOrElse(return None)
      qD(c).toColumn(n)
    }

    val mvDf = spark.table(v.name)
    val filtered = comp.foldLeft(mvDf)(_.filter(_))

    (q.isAggregate, vq.isAggregate) match {
      case (false, false) =>
        // SPJ over SPJ view: project the requested columns
        val sel = q.projection.map { case (cr, name) =>
          col(mvName(cr.column).getOrElse(return None)).as(name)
        }
        Some(filtered.select(sel: _*))

      case (true, false) =>
        // aggregate over an SPJ (e.g. denormalized) view: group and
        // aggregate directly on the view. Aggregate args reference source
        // column names, so the view must expose them under the same names.
        val groupCols = q.groupBy.get.map(_.column).distinct
        groupCols.foreach(c => if (!mvName(c).contains(c)) return None)
        q.aggs.foreach(_.argCols.foreach(c => if (!mvName(c).contains(c)) return None))
        val aggCols = q.aggs.map(a => directAgg(a).as(a.outName))
        val agged = filtered.groupBy(groupCols.map(col): _*)
          .agg(aggCols.head, aggCols.tail: _*)
        Some(renameOut(agged, q))

      case (true, true) =>
        // SPJA over SPJA view: rollup-derive each aggregate
        val groupCols = q.groupBy.get.map(_.column).distinct
        val mvGroup = groupCols.map(c => mvName(c).getOrElse(return None))
        val derived = q.aggs.map(a => derivedAgg(a, vq).getOrElse(return None).as(a.outName))
        if (derived.isEmpty) return None
        val agged = filtered.groupBy(mvGroup.map(col): _*)
          .agg(derived.head, derived.tail: _*)
        // rename rolled-up group columns from view names to query names
        val sel = q.outOrder.map { n =>
          q.groupOut.find(_._2 == n) match {
            case Some((cr, _)) => col(mvName(cr.column).get).as(n)
            case None          => col(n)
          }
        }
        Some(agged.select(sel: _*))

      case (false, true) => None // SPJ query cannot read an aggregated view
    }
  }

  /** Aggregate computed directly from source-named columns. */
  private def directAgg(a: AggSpec): Column = a.func match {
    case "sum"        => sum(expr(a.arg.get))
    case "min"        => min(expr(a.arg.get))
    case "max"        => max(expr(a.arg.get))
    case "count"      => count(expr(a.arg.get))
    case "count_star" => count(lit(1))
  }

  /** Rollup derivation of a query aggregate from a view's aggregate output:
    * SUM/COUNT re-sum, MIN/MAX re-min/max (§4.4). */
  private def derivedAgg(a: AggSpec, vq: SpjaQuery): Option[Column] = {
    val matching = vq.aggs.find(va => va.func == a.func && va.arg == a.arg)
    matching.map { va =>
      a.func match {
        case "sum" | "count" | "count_star" => sum(col(va.outName))
        case "min"                          => min(col(va.outName))
        case "max"                          => max(col(va.outName))
      }
    }
  }

  private def renameOut(agged: DataFrame, q: SpjaQuery): DataFrame = {
    val sel = q.outOrder.map { n =>
      q.groupOut.find(_._2 == n) match {
        case Some((cr, _)) => col(cr.column).as(n)
        case None          => col(n)
      }
    }
    agged.select(sel: _*)
  }

  // --------------------------------------------------------------- partial

  private[core] def tryPartial(spark: SparkSession, q: SpjaQuery, v: MaterializedView,
                               catalog: MvCatalog): Option[DataFrame] = {
    val vq = v.query
    if (q.tables != vq.tables || q.joins != vq.joins) return None
    if (q.isAggregate != vq.isAggregate && !(q.isAggregate && !vq.isAggregate)) return None
    val qD = Dom.ofPreds(q.preds).getOrElse(return None)
    val vD = Dom.ofPreds(vq.preds).getOrElse(return None)

    // exactly one failing column, numeric on both sides
    val failing = vD.keys.filter { c =>
      !qD.get(c).exists(_.implies(vD(c)))
    }.toSeq
    if (failing.size != 1) return None
    val c = failing.head
    val qd = qD.getOrElse(c, Dom.unconstrainedNum) match {
      case n: NumDom => n; case _ => return None
    }
    val vd = vD(c) match { case n: NumDom => n; case _ => return None }

    val missing = qd.subtract(vd).getOrElse(return None)
    if (missing.isEmpty) return None

    // MV part: query restricted to the view's region on the split column
    val mvDoms = qD.updated(c, qd.intersect(vd))
    val part1 = tryFullWithDoms(spark, q, mvDoms, v).getOrElse(return None)

    // source part: recompute the missing region(s) from the source tables
    val missingFilter = missing.map(_.toColumn(c)).reduce(_ || _)
    val part2 = buildFromSources(spark, q, qD, catalog, missingFilter).getOrElse(return None)

    // combine (Figure 4c): UNION ALL then re-aggregate
    val unioned = part1.unionByName(part2)
    if (!q.isAggregate) Some(unioned)
    else {
      val groupNames = q.groupOut.map(_._2).distinct
      val reagg = q.aggs.map { a =>
        (a.func match {
          case "sum" | "count" | "count_star" => sum(col(a.outName))
          case "min"                          => min(col(a.outName))
          case "max"                          => max(col(a.outName))
        }).as(a.outName)
      }
      if (reagg.isEmpty) return None
      val agged =
        if (groupNames.isEmpty) unioned.agg(reagg.head, reagg.tail: _*)
        else unioned.groupBy(groupNames.map(col): _*).agg(reagg.head, reagg.tail: _*)
      Some(agged.select(q.outOrder.map(col): _*))
    }
  }

  /** Rebuilds the query directly over its source tables with an extra
    * filter — used for the non-covered slice of a partial rewrite. */
  private def buildFromSources(spark: SparkSession, q: SpjaQuery, qD: Map[String, Dom],
                               catalog: MvCatalog, extra: Column): Option[DataFrame] = {
    val owner: Map[String, String] = q.tables.flatMap { t =>
      spark.table(t).columns.map(_ -> t)
    }.toMap

    // chain joins: start anywhere, repeatedly attach a table connected
    // through some join condition
    val tables = q.tables.toSeq.sorted
    var included = Set(tables.head)
    var joined = spark.table(tables.head)
    var remaining = tables.tail.toSet
    while (remaining.nonEmpty) {
      val next = remaining.find { t =>
        q.joins.exists { case (a, b) =>
          (owner.get(a).contains(t) && owner.get(b).exists(included.contains)) ||
            (owner.get(b).contains(t) && owner.get(a).exists(included.contains))
        }
      }.getOrElse(return None) // disconnected join graph
      val conds = q.joins.toSeq.filter { case (a, b) =>
        (owner.get(a).contains(next) && owner.get(b).exists(included.contains)) ||
          (owner.get(b).contains(next) && owner.get(a).exists(included.contains))
      }.map { case (a, b) => col(a) === col(b) }
      joined = joined.join(spark.table(next), conds.reduce(_ && _))
      included += next
      remaining -= next
    }

    val filtered = qD.foldLeft(joined.filter(extra)) { case (d, (c, dom)) =>
      d.filter(dom.toColumn(c))
    }

    if (!q.isAggregate) {
      Some(filtered.select(q.projection.map { case (cr, n) => col(cr.column).as(n) }: _*))
    } else {
      val groupCols = q.groupBy.get.map(_.column).distinct
      val aggCols = q.aggs.map(a => directAgg(a).as(a.outName))
      if (aggCols.isEmpty) return None
      val agged =
        if (groupCols.isEmpty) filtered.agg(aggCols.head, aggCols.tail: _*)
        else filtered.groupBy(groupCols.map(col): _*).agg(aggCols.head, aggCols.tail: _*)
      Some(renameOut(agged, q))
    }
  }
}
