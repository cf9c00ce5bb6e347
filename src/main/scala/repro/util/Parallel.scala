package repro.util

import java.util.concurrent.atomic.AtomicLongArray
import java.util.concurrent.{Callable, ExecutorService, Executors, TimeUnit}

/** Shared-memory parallel primitives used by the PAR-* implementations.
  *
  * The paper runs on a 30-core machine with a work-stealing scheduler; here we
  * use a fixed thread pool whose size is controllable per call so the Fig-7
  * thread-scaling experiment can sweep 1..16 threads deterministically.
  */
object Parallel {

  /** Default parallelism: all available cores. */
  val defaultThreads: Int = Runtime.getRuntime.availableProcessors()

  // One lazily-created pool per requested size. Pools are tiny; a handful of
  // sizes (1,2,4,8,16) are ever requested.
  private val pools = new java.util.concurrent.ConcurrentHashMap[Int, ExecutorService]()

  private def pool(threads: Int): ExecutorService =
    pools.computeIfAbsent(threads, t => Executors.newFixedThreadPool(t, r => {
      val th = new Thread(r); th.setDaemon(true); th
    }))

  /** Parallel for over `[0, n)` with `threads` workers; blocks until done.
    * Work is split into `threads * 8` contiguous chunks for load balance
    * (a poor-man's work stealing: stragglers pick up remaining chunks).
    */
  def forRange(n: Int, threads: Int = defaultThreads)(body: Int => Unit): Unit = {
    if (n <= 0) return
    if (threads <= 1 || n < 512) { var i = 0; while (i < n) { body(i); i += 1 }; return }
    val chunks    = math.min(n, threads * 8)
    val chunkSize = (n + chunks - 1) / chunks
    val next      = new java.util.concurrent.atomic.AtomicInteger(0)
    val tasks     = new java.util.ArrayList[Callable[Unit]](threads)
    for (_ <- 0 until threads) tasks.add { () =>
      var c = next.getAndIncrement()
      while (c < chunks) {
        val lo = c * chunkSize
        val hi = math.min(n, lo + chunkSize)
        var i = lo
        while (i < hi) { body(i); i += 1 }
        c = next.getAndIncrement()
      }
    }
    val futures = pool(threads).invokeAll(tasks)
    futures.forEach(_.get()) // propagate exceptions
  }

  /** Parallel map over `[0, n)` producing per-chunk results that are reduced
    * with `combine`. Used for parallel aggregation (e.g. rebuilding cluster
    * weights in the synchronous setting).
    */
  def mapReduceRange[A](n: Int, threads: Int = defaultThreads)(
      zero: () => A)(body: (A, Int) => Unit)(combine: (A, A) => A): A = {
    if (n <= 0) return zero()
    if (threads <= 1 || n < 512) {
      val acc = zero(); var i = 0; while (i < n) { body(acc, i); i += 1 }; acc
    } else {
      val chunks    = math.min(n, threads * 4)
      val chunkSize = (n + chunks - 1) / chunks
      val tasks     = new java.util.ArrayList[Callable[A]](chunks)
      for (c <- 0 until chunks) tasks.add { () =>
        val acc = zero()
        val lo = c * chunkSize; val hi = math.min(n, lo + chunkSize)
        var i = lo
        while (i < hi) { body(acc, i); i += 1 }
        acc
      }
      val futures = pool(threads).invokeAll(tasks)
      var acc: Option[A] = None
      futures.forEach { f =>
        val a = f.get()
        acc = Some(acc.fold(a)(combine(_, a)))
      }
      acc.get
    }
  }

  /** Shut down all cached pools (test hygiene; pools are daemon anyway). */
  def shutdown(): Unit = {
    pools.values.forEach { p => p.shutdown(); p.awaitTermination(1, TimeUnit.SECONDS) }
    pools.clear()
  }
}

/** Atomic array of doubles built on CAS over raw long bits — the paper's
  * "separate atomic operations to update the total vertex weight" with no
  * locks and relaxed consistency.
  */
final class AtomicDoubleArray(val length: Int) {
  private val bits = new AtomicLongArray(length)

  def get(i: Int): Double = java.lang.Double.longBitsToDouble(bits.get(i))

  def set(i: Int, v: Double): Unit = bits.set(i, java.lang.Double.doubleToRawLongBits(v))

  /** Lock-free add; loops on CAS failure. */
  def add(i: Int, delta: Double): Unit = {
    var done = false
    while (!done) {
      val cur  = bits.get(i)
      val next = java.lang.Double.doubleToRawLongBits(java.lang.Double.longBitsToDouble(cur) + delta)
      done = bits.compareAndSet(i, cur, next)
    }
  }

  def toArray: Array[Double] = Array.tabulate(length)(get)
}
