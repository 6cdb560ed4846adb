package repro.llap

import java.util.concurrent.atomic.AtomicInteger

import org.scalatest.funsuite.AnyFunSuite

import repro.metastore._

class LlapDaemonSpec extends AnyFunSuite {

  test("daemon executes fragments and counts them") {
    val d = new LlapDaemon(4)
    val results = d.runQuery((1 to 8).map(i => () => i * i))
    assert(results == Seq(1, 4, 9, 16, 25, 36, 49, 64))
    assert(d.fragmentsExecuted.get == 8)
    d.shutdown()
  }

  test("daemon runs fragments concurrently up to the executor count") {
    val d = new LlapDaemon(4)
    val concurrent = new AtomicInteger(0)
    val peak = new AtomicInteger(0)
    d.runQuery((1 to 8).map(_ => () => {
      val c = concurrent.incrementAndGet()
      peak.updateAndGet(p => math.max(p, c))
      Thread.sleep(30)
      concurrent.decrementAndGet()
    }))
    assert(peak.get >= 2 && peak.get <= 4, s"peak=$peak")
    d.shutdown()
  }

  test("daemon persists across queries (no per-query start-up)") {
    val d = new LlapDaemon(2)
    val t0 = System.nanoTime()
    (1 to 5).foreach(_ => d.runQuery(Seq(() => 1)))
    val ms = (System.nanoTime() - t0) / 1000000
    assert(ms < 500, s"daemon queries should be near-instant, took ${ms}ms")
    d.shutdown()
  }

  test("container runtime pays the allocation delay on every query") {
    val c = new ContainerRuntime(2, allocationDelayMs = 50)
    val t0 = System.nanoTime()
    (1 to 3).foreach(_ => c.runQuery(Seq(() => 1)))
    val ms = (System.nanoTime() - t0) / 1000000
    assert(ms >= 150, s"3 queries x 50ms allocation, took only ${ms}ms")
    assert(c.containersAllocated.get == 6)
  }

  test("container runtime drops the LLAP caches after each query") {
    LlapIo.configure(16L << 20)
    // warm the cache artificially
    val b = new ColumnVec.Builder(org.apache.spark.sql.types.LongType, 4)
    (1 to 4).foreach(i => b.appendLong(i.toLong))
    LlapIo.cache.put(ChunkKey("f", 0, 0), b.result())
    assert(LlapIo.cache.entryCount == 1)
    new ContainerRuntime(1, 0).runQuery(Seq(() => 1))
    assert(LlapIo.cache.entryCount == 0, "containers must not inherit cache state")
  }
}

class WorkloadManagerSpec extends AnyFunSuite {

  /** The paper's §5.2 example: bi pool (80%, parallelism 5), etl (20%, 20),
    * a downgrade trigger on bi, an application mapping, default pool etl. */
  private def daytime(biParallelism: Int = 5, etlParallelism: Int = 20) = ResourcePlanDef(
    "daytime",
    pools = Seq(PoolDef("bi", 0.8, biParallelism), PoolDef("etl", 0.2, etlParallelism)),
    mappings = Seq(ApplicationMapping("visualization_app", "bi")),
    triggers = Map("bi" -> Seq(TriggerDef("downgrade", "total_runtime", 3000, MoveToPool("etl")))),
    defaultPool = Some("etl"))

  test("application mapping routes to bi; default routes to etl") {
    val wm = new WorkloadManager(daytime())
    assert(wm.admit("q1", application = Some("visualization_app")) == Admitted("bi"))
    assert(wm.admit("q2") == Admitted("etl"))
  }

  test("pool parallelism is enforced") {
    val wm = new WorkloadManager(daytime(biParallelism = 2, etlParallelism = 1))
    assert(wm.admit("q1", Some("visualization_app")) == Admitted("bi"))
    assert(wm.admit("q2", Some("visualization_app")) == Admitted("bi"))
    assert(wm.admit("q3") == Admitted("etl"))
    // both pools full now
    assert(wm.admit("q4") == Queued)
    assert(wm.isQueued("q4"))
  }

  test("idle resources of another pool are lent out") {
    val wm = new WorkloadManager(daytime(biParallelism = 1, etlParallelism = 5))
    wm.admit("q1", Some("visualization_app"))
    val a = wm.admit("q2", Some("visualization_app"))
    assert(a == Admitted("bi", borrowedFrom = Some("etl")),
      "bi is full but etl has idle capacity to lend")
  }

  test("release admits a waiting query") {
    val wm = new WorkloadManager(daytime(biParallelism = 1, etlParallelism = 1))
    wm.admit("q1", Some("visualization_app"))
    wm.admit("q2")
    assert(wm.admit("q3") == Queued)
    wm.release("q2")
    assert(!wm.isQueued("q3") && wm.poolOf("q3").contains("etl"))
  }

  test("trigger moves a long-running query from bi to etl (paper's rule)") {
    val wm = new WorkloadManager(daytime())
    wm.admit("q1", Some("visualization_app"))
    assert(wm.reportMetric("q1", "total_runtime", 2000) == NoAction)
    assert(wm.reportMetric("q1", "total_runtime", 3500) == Moved("bi", "etl"))
    assert(wm.poolOf("q1").contains("etl"))
  }

  test("kill trigger removes the query") {
    val plan = ResourcePlanDef("p",
      pools = Seq(PoolDef("bi", 1.0, 5)),
      triggers = Map("bi" -> Seq(TriggerDef("kill", "memory", 100, KillQuery))),
      defaultPool = Some("bi"))
    val wm = new WorkloadManager(plan)
    wm.admit("q1")
    assert(wm.reportMetric("q1", "memory", 500) == Killed)
    assert(wm.isKilled("q1") && wm.runningCount == 0)
  }

  test("metrics for unknown queries are ignored") {
    val wm = new WorkloadManager(daytime())
    assert(wm.reportMetric("ghost", "total_runtime", 99999) == NoAction)
  }

  test("admission fails without a resolvable pool") {
    val plan = ResourcePlanDef("p", pools = Seq(PoolDef("only", 1.0, 1)))
    val wm = new WorkloadManager(plan)
    assertThrows[IllegalStateException](wm.admit("q1"))
  }
}
