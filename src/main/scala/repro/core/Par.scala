package repro.core

import java.util.concurrent.{Callable, ExecutorService, Executors, TimeUnit}
import java.util.concurrent.atomic.AtomicInteger
import scala.collection.mutable.ArrayBuffer

/** Thread-pool parallel-for substrate.
  *
  * The paper's implementation uses ParlayLib's fork-join primitives on a
  * 48-core machine; the self-relative-speedup experiment (Fig. 4 / bench
  * T2) needs an explicit, per-call thread-count knob, which Scala's global
  * parallel collections do not give us. `Par` runs index-range loops on a
  * dedicated fixed pool of `threads` workers with block partitioning plus
  * work-stealing via a shared atomic chunk counter.
  *
  * All methods are synchronous: they return only after every index has
  * been processed, so caller-visible writes by the body are safely
  * published (pool handoff provides the happens-before edges).
  */
final class Par(val threads: Int) extends AutoCloseable {
  require(threads >= 1, s"threads must be >= 1, got $threads")

  private val pool: ExecutorService =
    if (threads == 1) null else Executors.newFixedThreadPool(threads)

  /** Parallel `for (i <- 0 until n) body(i)` with dynamic chunking. */
  def parFor(n: Int, grain: Int = 1)(body: Int => Unit): Unit = {
    if (n <= 0) return
    if (threads == 1 || n <= grain) {
      var i = 0; while (i < n) { body(i); i += 1 }
      return
    }
    val chunk   = math.max(grain, n / (threads * 8) + 1)
    val nChunks = (n + chunk - 1) / chunk
    val next    = new AtomicInteger(0)
    val tasks   = new java.util.ArrayList[Callable[Unit]](threads)
    var t = 0
    while (t < threads) {
      tasks.add { () =>
        var c = next.getAndIncrement()
        while (c < nChunks) {
          val lo = c * chunk
          val hi = math.min(n, lo + chunk)
          var i = lo; while (i < hi) { body(i); i += 1 }
          c = next.getAndIncrement()
        }
      }
      t += 1
    }
    val futures = pool.invokeAll(tasks)
    // surface worker exceptions to the caller
    val it = futures.iterator()
    while (it.hasNext) it.next().get()
  }

  /** Parallel map over 0 until n into a fresh array. */
  def parMap[A: reflect.ClassTag](n: Int, grain: Int = 1)(f: Int => A): Array[A] = {
    val out = new Array[A](n)
    parFor(n, grain)(i => out(i) = f(i))
    out
  }

  /** Parallel reduction of f(0) op f(1) op ... op f(n-1); op must be
    * associative and commutative. Returns `zero` for n == 0.
    */
  def parReduce[A](n: Int, zero: A, grain: Int = 1)(f: Int => A)(op: (A, A) => A): A = {
    if (n <= 0) return zero
    if (threads == 1 || n <= grain) {
      var acc = zero; var i = 0
      while (i < n) { acc = op(acc, f(i)); i += 1 }
      return acc
    }
    val partials = new ArrayBuffer[A]()
    val lock     = new Object
    val chunk    = math.max(grain, n / (threads * 8) + 1)
    val nChunks  = (n + chunk - 1) / chunk
    val next     = new AtomicInteger(0)
    val tasks    = new java.util.ArrayList[Callable[Unit]](threads)
    var t = 0
    while (t < threads) {
      tasks.add { () =>
        var acc   = zero
        var wrote = false
        var c = next.getAndIncrement()
        while (c < nChunks) {
          val lo = c * chunk
          val hi = math.min(n, lo + chunk)
          var i = lo; while (i < hi) { acc = op(acc, f(i)); i += 1 }
          wrote = true
          c = next.getAndIncrement()
        }
        if (wrote) lock.synchronized { partials += acc }
      }
      t += 1
    }
    val futures = pool.invokeAll(tasks)
    val it = futures.iterator()
    while (it.hasNext) it.next().get()
    partials.foldLeft(zero)(op)
  }

  override def close(): Unit =
    if (pool != null) { pool.shutdown(); pool.awaitTermination(10, TimeUnit.SECONDS); () }
}

object Par {
  /** Run `f` with a pool of `threads` workers, closing the pool after. */
  def withThreads[A](threads: Int)(f: Par => A): A = {
    val p = new Par(threads)
    try f(p) finally p.close()
  }

  /** A Par over all available processors (for non-sweep callers). */
  def default[A](f: Par => A): A = withThreads(Runtime.getRuntime.availableProcessors())(f)
}
