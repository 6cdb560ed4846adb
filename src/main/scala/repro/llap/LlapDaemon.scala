package repro.llap

import java.util.concurrent.{Callable, ExecutorService, Executors, Future => JFuture, ThreadFactory}
import java.util.concurrent.atomic.AtomicLong

/** Execution runtimes for query fragments (§5.1).
  *
  * [[LlapDaemon]] models the persistent multi-threaded daemon: a fixed pool
  * of executors that runs continuously, so fragments start with zero
  * allocation overhead and JIT-warm code. [[ContainerRuntime]] models the
  * pre-LLAP container path: every query pays a container-allocation delay
  * before its fragments run, and no state (caches) survives between queries.
  */
trait FragmentRuntime {
  /** Runs a query's fragments; fragments may run concurrently. */
  def runQuery[A](fragments: Seq[() => A]): Seq[A]
  def shutdown(): Unit
}

object FragmentRuntime {
  private[llap] def daemonFactory(prefix: String): ThreadFactory = new ThreadFactory {
    private val n = new AtomicLong(0)
    override def newThread(r: Runnable): Thread = {
      val t = new Thread(r, s"$prefix-${n.incrementAndGet()}")
      t.setDaemon(true); t
    }
  }
}

/** A persistent LLAP daemon with `numExecutors` fragment executors and a
  * local work queue. Stateless with respect to queries: any executor can
  * run any fragment. */
final class LlapDaemon(val numExecutors: Int) extends FragmentRuntime {
  require(numExecutors > 0)
  private val pool: ExecutorService =
    Executors.newFixedThreadPool(numExecutors, FragmentRuntime.daemonFactory("llap-exec"))
  val fragmentsExecuted = new AtomicLong

  /** Submits one fragment to the executor pool. */
  def submit[A](fragment: () => A): JFuture[A] =
    pool.submit(new Callable[A] {
      override def call(): A = { fragmentsExecuted.incrementAndGet(); fragment() }
    })

  override def runQuery[A](fragments: Seq[() => A]): Seq[A] =
    fragments.map(submit).map(_.get())

  override def shutdown(): Unit = pool.shutdown()
}

/** Pre-LLAP execution: each query allocates fresh containers (modelled as a
  * fixed allocation delay — the YARN round-trip the paper calls "a critical
  * bottleneck for low latency queries") and tears them down afterwards, so
  * no cache state survives. */
final class ContainerRuntime(
    val numContainers: Int,
    val allocationDelayMs: Long) extends FragmentRuntime {
  require(numContainers > 0 && allocationDelayMs >= 0)
  val containersAllocated = new AtomicLong

  override def runQuery[A](fragments: Seq[() => A]): Seq[A] = {
    // container allocation happens once per query, before any fragment runs
    Thread.sleep(allocationDelayMs)
    containersAllocated.addAndGet(numContainers.toLong)
    val pool = Executors.newFixedThreadPool(numContainers, FragmentRuntime.daemonFactory("container"))
    try fragments.map(f => pool.submit(new Callable[A] { override def call(): A = f() })).map(_.get())
    finally {
      pool.shutdown()
      // containers are killed after the query: the LLAP caches do not persist
      LlapIo.dropAll()
    }
  }

  override def shutdown(): Unit = ()
}
