package repro.local

import java.util.concurrent.ForkJoinPool
import java.util.concurrent.atomic.AtomicInteger

/** Thread-pool substrate for the local (shared-memory) engine.
  *
  * Mirrors the paper's OpenMP `parallel_for` / reductions: every parallel
  * method takes an explicit thread count `t` so the bench harness can sweep
  * concurrency (Table 10's hardware proxy) exactly like the paper sweeps
  * threads. `t <= 1` degenerates to a plain sequential loop so sequential
  * baselines and parallel ones share the same code paths.
  */
object Par {

  /** Default concurrency: container cores capped at 16 (the bench default). */
  val defaultThreads: Int =
    math.min(16, Runtime.getRuntime.availableProcessors())

  private val pools = new java.util.concurrent.ConcurrentHashMap[Int, ForkJoinPool]()

  private def pool(t: Int): ForkJoinPool =
    pools.computeIfAbsent(t, n => new ForkJoinPool(n))

  /** `parallel_for i in [0, n)` over `t` threads using static block
    * partitioning. `minPar` is the sequential cutoff: leave the default for
    * light loop bodies (array scans); pass a small value when each
    * iteration is heavy (clique enumeration) so small ranges still fan out.
    */
  def parallelFor(n: Int, t: Int, minPar: Int = 2048)(body: Int => Unit): Unit = {
    if (t <= 1 || n < minPar) {
      var i = 0; while (i < n) { body(i); i += 1 }
    } else {
      val chunks = t * 4
      val next   = new AtomicInteger(0)
      val tasks = (0 until t).map { _ =>
        pool(t).submit(new Runnable {
          def run(): Unit = {
            var c = next.getAndIncrement()
            while (c < chunks) {
              val lo = (n.toLong * c / chunks).toInt
              val hi = (n.toLong * (c + 1) / chunks).toInt
              var i = lo; while (i < hi) { body(i); i += 1 }
              c = next.getAndIncrement()
            }
          }
        })
      }
      tasks.foreach(_.join())
    }
  }

  /** `parallel_sum` of `term(i)` for i in [0, n). */
  def parallelSum(n: Int, t: Int)(term: Int => Double): Double = {
    if (t <= 1 || n < 2048) {
      var s = 0.0; var i = 0; while (i < n) { s += term(i); i += 1 }; s
    } else {
      val partial = new Array[Double](t * 4)
      val chunks  = t * 4
      parallelForChunks(chunks, t) { c =>
        val lo = (n.toLong * c / chunks).toInt
        val hi = (n.toLong * (c + 1) / chunks).toInt
        var s = 0.0; var i = lo
        while (i < hi) { s += term(i); i += 1 }
        partial(c) = s
      }
      partial.sum
    }
  }

  private def parallelForChunks(chunks: Int, t: Int)(body: Int => Unit): Unit = {
    val next = new AtomicInteger(0)
    val tasks = (0 until t).map { _ =>
      pool(t).submit(new Runnable {
        def run(): Unit = {
          var c = next.getAndIncrement()
          while (c < chunks) { body(c); c = next.getAndIncrement() }
        }
      })
    }
    tasks.foreach(_.join())
  }
}
