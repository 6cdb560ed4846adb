package repro.util

/** Wall-clock measurement helpers shared by the benchmark harnesses. */
object Timing {

  /** Runs `body` and returns (result, elapsedMillis). */
  def timed[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1000000L)
  }

  /** Median of `reps` timed runs — robust to a slow first (JIT-cold) run. */
  def medianMillis(reps: Int)(body: => Unit): Long = {
    require(reps >= 1)
    val times = (1 to reps).map(_ => timed(body)._2).sorted
    times(times.size / 2)
  }

  /** Renders a two-column comparison table used by the bench suites. */
  def table(title: String, header: (String, String, String), rows: Seq[(String, String, String)]): String = {
    val all = header +: rows
    val w1 = all.map(_._1.length).max
    val w2 = all.map(_._2.length).max
    val w3 = all.map(_._3.length).max
    val sep = "-" * (w1 + w2 + w3 + 8)
    val lines = all.map { case (a, b, c) =>
      s"| ${a.padTo(w1, ' ')} | ${b.padTo(w2, ' ')} | ${c.padTo(w3, ' ')} |"
    }
    (title +: sep +: lines.head +: sep +: lines.tail :+ sep).mkString("\n")
  }
}
