package repro.core

import java.util.concurrent.Executors

import org.apache.spark.sql.functions._

import repro.SparkSpec

class ResultCacheSpec extends SparkSpec with StarFixture {

  private def freshCache(maxEntries: Int = 64) = new ResultCache(spark, maxEntries)

  private val snapA = Map("store_sales" -> 1L)
  private val snapB = Map("store_sales" -> 2L)

  private def q1 = spark.sql("SELECT COUNT(*) AS c FROM store_sales WHERE ss_quantity > 3")

  test("second identical query under the same snapshot is a hit") {
    starCatalog()
    val cache = freshCache()
    val (r1, hit1) = cache.getOrCompute(q1, snapA)
    val (r2, hit2) = cache.getOrCompute(q1, snapA)
    assert(!hit1 && hit2)
    assert(r1 == r2)
    assert(cache.hits.get == 1 && cache.misses.get == 1)
  }

  test("textually different but semantically identical queries share an entry") {
    starCatalog()
    val cache = freshCache()
    cache.getOrCompute(
      spark.sql("SELECT COUNT(*) AS c FROM store_sales WHERE ss_quantity > 3"), snapA)
    val (_, hit) = cache.getOrCompute(
      spark.sql("select count(*) AS c from store_sales where ss_quantity > 3"), snapA)
    assert(hit, "canonicalized-plan keying should unify equivalent ASTs")
  }

  test("a snapshot change is a miss (transactional consistency)") {
    starCatalog()
    val cache = freshCache()
    cache.getOrCompute(q1, snapA)
    val (_, hit) = cache.getOrCompute(q1, snapB)
    assert(!hit, "stale result served after the table changed")
  }

  test("different queries do not collide") {
    starCatalog()
    val cache = freshCache()
    cache.getOrCompute(q1, snapA)
    val (_, hit) = cache.getOrCompute(
      spark.sql("SELECT COUNT(*) AS c FROM store_sales WHERE ss_quantity > 4"), snapA)
    assert(!hit)
  }

  test("non-deterministic queries are never cached") {
    starCatalog()
    val cache = freshCache()
    val q = spark.sql("SELECT COUNT(*) AS c FROM store_sales WHERE rand() > 0.5")
    assert(!cache.isEligible(q))
    cache.getOrCompute(q, snapA)
    cache.getOrCompute(q, snapA)
    assert(cache.hits.get == 0 && cache.entryCount == 0)
  }

  test("runtime-constant functions (current_date/current_timestamp) are ineligible") {
    starCatalog()
    assert(!new ResultCache(spark).isEligible(
      spark.sql("SELECT COUNT(*) AS c FROM store_sales WHERE ss_quantity > 0 AND current_date() > DATE'2000-01-01'")))
    assert(!new ResultCache(spark).isEligible(
      spark.sql("SELECT current_timestamp() AS t, COUNT(*) AS c FROM store_sales")))
  }

  test("invalidateTable expunges entries of the changed table") {
    starCatalog()
    val cache = freshCache()
    cache.getOrCompute(q1, snapA)
    assert(cache.entryCount == 1)
    cache.invalidateTable("store_sales", currentWriteId = 2L)
    assert(cache.entryCount == 0)
  }

  test("capacity bound expunges oldest entries") {
    starCatalog()
    val cache = freshCache(maxEntries = 3)
    (1 to 5).foreach { n =>
      cache.getOrCompute(
        spark.sql(s"SELECT COUNT(*) AS c FROM store_sales WHERE ss_quantity > $n"), snapA)
    }
    assert(cache.entryCount <= 3)
  }

  test("thundering herd: concurrent identical queries compute once") {
    starCatalog()
    val cache = freshCache()
    val pool = Executors.newFixedThreadPool(4)
    try {
      val futures = (1 to 4).map { _ =>
        pool.submit(new java.util.concurrent.Callable[Boolean] {
          override def call(): Boolean = cache.getOrCompute(
            spark.sql("SELECT SUM(ss_sales_price) AS s FROM store_sales"), snapA)._2
        })
      }
      val hits = futures.map(_.get()).count(identity)
      // at most one runner misses to fill; the rest hit or wait on the
      // pending entry (also counted as hits once the result lands)
      assert(cache.misses.get == 1, s"herd recomputed: misses=${cache.misses.get}")
      assert(hits >= 1)
    } finally pool.shutdown()
  }
}
