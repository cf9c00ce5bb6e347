package repro.core

import java.util.SplittableRandom
import java.util.concurrent.atomic.{AtomicIntegerArray, LongAdder}
import repro.graph.LocalGraph
import repro.util.{AtomicDoubleArray, IntDoubleMap, Parallel}
import scala.collection.mutable.ArrayBuffer

/** PARALLEL-CC (paper Alg. 1): the shared-memory parallel Louvain relaxation.
  *
  * In the **async** setting every worker applies its vertex's move
  * immediately: the cluster id write and the two cluster-weight updates are
  * separate atomic operations with no synchronization, so concurrent best-move
  * computations read racy snapshots — exactly the paper's relaxed-consistency
  * scheme that provides symmetry breaking. In the **sync** setting all desired
  * moves are computed against a frozen snapshot and applied together, after
  * which cluster weights are rebuilt by parallel aggregation; this reproduces
  * the Figure-1 pathology (vertices oscillating into each other's clusters).
  */
object ParLouvain extends LouvainEngine {

  private val Eps = 1e-11

  def cluster(g: LocalGraph, lambda: Double, opts: LouvainOptions = LouvainOptions()): LouvainResult =
    LouvainDriver.run(g, lambda, opts, this)

  /** PAR-MOD: modularity via the k=d, λ=γ/2W reduction (paper §2). */
  def clusterModularity(g: LocalGraph, gamma: Double,
                        opts: LouvainOptions = LouvainOptions()): LouvainResult = {
    val w = g.totalEdgeWeight
    LouvainDriver.run(g.withDegreeWeights, gamma / (2 * w), opts, this)
  }

  override def compressionThreads(opts: LouvainOptions): Int = opts.threads

  override def bestMoves(
      g: LocalGraph, lambda: Double, opts: LouvainOptions,
      rng: SplittableRandom, init: Array[Int]): BestMovesResult = {
    val n       = g.numVertices
    val threads = opts.threads
    val cluster = new AtomicIntegerArray(2 * n) // only [0,n) used as indices
    var v = 0
    while (v < n) { cluster.set(v, init(v)); v += 1 }
    val kOf  = g.vertexWeight
    val kC   = new AtomicDoubleArray(2 * n)
    val size = new AtomicIntegerArray(2 * n)
    v = 0
    while (v < n) { kC.add(init(v), kOf(v)); size.incrementAndGet(init(v)); v += 1 }

    // Per-thread scratch map for the neighbor-cluster aggregation.
    val tlMap = ThreadLocal.withInitial[IntDoubleMap](() => new IntDoubleMap(64))

    val mark       = new Array[Boolean](n)
    val affected   = new Array[Boolean](2 * n) // benign races: monotonic writes
    val movedFlag  = new Array[Boolean](n)     // single writer per index
    var frontier   = FrontierOps.all(n)
    var passes     = 0
    var anyMoved   = false
    var timedOut   = false
    var break      = false

    /** Best target for `u` under the current (possibly racy) snapshot. */
    def bestTarget(u: Int): Int = {
      val c  = cluster.get(u)
      val kU = kOf(u)
      val map = tlMap.get()
      map.clear()
      var i = g.offsets(u)
      while (i < g.offsets(u + 1)) { map.addTo(cluster.get(g.nbrs(i)), g.wgts(i)); i += 1 }
      val wToC       = map.getOrElse(c, 0.0)
      val removeGain = -(wToC - lambda * kU * (kC.get(c) - kU))
      var bestDelta  = 0.0
      var bestT      = c
      map.foreachEntry { (c2, w2) =>
        if (c2 != c) {
          val d = removeGain + w2 - lambda * kU * kC.get(c2)
          if (d > bestDelta + Eps) { bestDelta = d; bestT = c2 }
        }
      }
      if (size.get(c) > 1 && removeGain > bestDelta + Eps) bestT = n + u
      bestT
    }

    def applyMove(u: Int, from: Int, to: Int): Unit = {
      cluster.set(u, to)
      kC.add(from, -kOf(u)); kC.add(to, kOf(u))
      size.decrementAndGet(from); size.incrementAndGet(to)
      movedFlag(u) = true
      if (opts.frontier == Frontier.NbrsOfClusters) { affected(from) = true; affected(to) = true }
    }

    while (!break && passes < opts.numIter && frontier.nonEmpty) {
      if (System.nanoTime() > opts.deadlineNanos) { timedOut = true; break = true }
      else {
        passes += 1
        java.util.Arrays.fill(movedFlag, false)
        if (opts.frontier == Frontier.NbrsOfClusters) java.util.Arrays.fill(affected, false)
        val movedCount = new LongAdder
        val front = frontier // capture for lambda

        opts.mode match {
          case MoveMode.Async =>
            Parallel.forRange(front.length, threads) { fi =>
              val u = front(fi)
              val c = cluster.get(u)
              val t = bestTarget(u)
              if (t != c) { applyMove(u, c, t); movedCount.increment() }
            }
          case MoveMode.Sync =>
            // Phase 1: desired moves against the frozen state (Line 7 only).
            val desired = new Array[Int](front.length)
            Parallel.forRange(front.length, threads)(fi => desired(fi) = bestTarget(front(fi)))
            // Phase 2: apply all moves, then rebuild aggregates in parallel.
            Parallel.forRange(front.length, threads) { fi =>
              val u = front(fi)
              val t = desired(fi)
              if (t != cluster.get(u)) {
                val c = cluster.get(u)
                cluster.set(u, t)
                movedFlag(u) = true
                movedCount.increment()
                if (opts.frontier == Frontier.NbrsOfClusters) { affected(c) = true; affected(t) = true }
              }
            }
            Parallel.forRange(2 * n, threads) { i => kC.set(i, 0.0); size.set(i, 0) }
            Parallel.forRange(n, threads) { u =>
              val c = cluster.get(u)
              kC.add(c, kOf(u)); size.incrementAndGet(c)
            }
        }

        if (movedCount.sum() == 0L) break = true
        else {
          anyMoved = true
          frontier = opts.frontier match {
            case Frontier.AllVertices => FrontierOps.all(n)
            case Frontier.NbrsOfVertices =>
              val moved = ArrayBuffer.empty[Int]
              var i = 0
              while (i < n) { if (movedFlag(i)) moved += i; i += 1 }
              FrontierOps.nbrsOfVertices(g, moved, mark, threads)
            case Frontier.NbrsOfClusters =>
              FrontierOps.nbrsOfClusters(g, cluster.get(_), affected, mark, threads)
          }
        }
      }
    }
    val out = new Array[Int](n)
    v = 0
    while (v < n) { out(v) = cluster.get(v); v += 1 }
    BestMovesResult(out, passes, anyMoved, timedOut)
  }
}
