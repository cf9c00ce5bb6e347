package repro.pcomp

import repro.graph.LocalGraph
import scala.collection.mutable.ArrayBuffer

/** Appendix-D reduction: monotone circuit-value problem → LambdaCC Louvain.
  *
  * The paper proves P-completeness of matching the Louvain output by encoding
  * a monotone circuit as a weighted graph (λ=0): running best local vertex
  * moves to convergence clusters every gate vertex with `t` or `f` according
  * to the gate's truth value. We implement the construction verbatim and use
  * it as an end-to-end correctness test of the weighted best-move machinery
  * (negative edges, carefully ordered magnitudes).
  */
object CircuitReduction {

  sealed trait Node
  final case class Input(value: Boolean)       extends Node
  final case class And(a: Int, b: Int)         extends Node
  final case class Or(a: Int, b: Int)          extends Node

  /** A monotone circuit: `nodes(i)` may reference only j < i. */
  final case class Circuit(nodes: IndexedSeq[Node]) {
    require(nodes.zipWithIndex.forall {
      case (Input(_), _)  => true
      case (And(a, b), i) => a < i && b < i
      case (Or(a, b), i)  => a < i && b < i
    }, "circuit must be topologically ordered")

    def evaluate: IndexedSeq[Boolean] = {
      val v = new Array[Boolean](nodes.length)
      nodes.zipWithIndex.foreach {
        case (Input(x), i)  => v(i) = x
        case (And(a, b), i) => v(i) = v(a) && v(b)
        case (Or(a, b), i)  => v(i) = v(a) || v(b)
      }
      v.toIndexedSeq
    }
  }

  /** Graph encoding. Vertices: 0 = t, 1 = f, then per circuit node i a gate
    * vertex g_i at `gateVertex(i)`, and for non-input gates a companion g'_i.
    */
  final case class Encoding(graph: LocalGraph, tVertex: Int, fVertex: Int,
                            gateVertex: IndexedSeq[Int])

  def encode(c: Circuit): Encoding = {
    val eps = 0.01
    val nG  = c.nodes.length
    val gate = new Array[Int](nG)
    var nextV = 2 // 0 = t, 1 = f
    val companions = new Array[Int](nG)
    c.nodes.zipWithIndex.foreach { case (node, i) =>
      gate(i) = nextV; nextV += 1
      node match {
        case Input(_) => companions(i) = -1
        case _        => companions(i) = nextV; nextV += 1
      }
    }
    val edges = ArrayBuffer.empty[(Int, Int, Double)]

    // Weight schedule. The paper scales gate weights down the topological
    // order via prefix products of degrees (appendix D); the binding
    // constraint is that the total weight of a gate's edges to its CONSUMERS
    // must stay below every decision margin at the gate itself — the
    // smallest margin in the construction is ε/6 · w (companion vs. the
    // "one-false-input" cluster). A geometric schedule with per-position
    // decay ε/(16·(maxFanout+2)) keeps the consumer slop under ε/16 · w,
    // comfortably inside every margin.
    val fanout = new Array[Int](nG)
    c.nodes.foreach {
      case Input(_) => ()
      case And(a, b) => fanout(a) += 1; fanout(b) += 1
      case Or(a, b)  => fanout(a) += 1; fanout(b) += 1
    }
    val maxFanout = if (nG == 0) 0 else fanout.max
    val decay     = eps / (16.0 * (maxFanout + 2))
    // Depth-based schedule (consumers are strictly deeper than their inputs),
    // normalized so the DEEPEST gate has weight 1 — keeping every decision
    // delta far above the Louvain engines' 1e-11 float-noise threshold.
    val depth = new Array[Int](nG)
    c.nodes.zipWithIndex.foreach {
      case (Input(_), i)  => depth(i) = 0
      case (And(a, b), i) => depth(i) = math.max(depth(a), depth(b)) + 1
      case (Or(a, b), i)  => depth(i) = math.max(depth(a), depth(b)) + 1
    }
    val maxDepth = if (nG == 0) 0 else depth.max
    val w0 = Array.tabulate(nG)(i => math.pow(decay, (depth(i) - maxDepth).toDouble))
    val big = 1e6 * (if (nG == 0) 1.0 else w0.max)

    edges += ((0, 1, -big)) // t–f strongly repel
    // Anchor literals for both polarities: the paper's inductive argument
    // assumes t and f each hold at least one literal with a +big edge (else,
    // e.g. with all-true inputs, the free f vertex chases a gate cluster and
    // flips its value). Two dummy inputs pin them.
    val tAnchor = nextV; nextV += 1
    val fAnchor = nextV; nextV += 1
    edges += ((tAnchor, 0, big))
    edges += ((fAnchor, 1, big))

    c.nodes.zipWithIndex.foreach { case (node, i) =>
      node match {
        case Input(x) =>
          val truth = if (x) 0 else 1
          edges += ((gate(i), truth, big))
        case And(a, b) =>
          val w = w0(i)
          edges += ((gate(i), gate(a), w))
          edges += ((gate(i), gate(b), w))
          edges += ((gate(i), companions(i), (2 + 2.0 / 3 * eps) * w))
          edges += ((gate(i), 0, (1 + 0.5 * eps) * w)) // AND: t edge is smaller
          edges += ((gate(i), 1, (1 + eps) * w))
        case Or(a, b) =>
          val w = w0(i)
          edges += ((gate(i), gate(a), w))
          edges += ((gate(i), gate(b), w))
          edges += ((gate(i), companions(i), (2 + 2.0 / 3 * eps) * w))
          edges += ((gate(i), 0, (1 + eps) * w)) // OR: t edge is larger
          edges += ((gate(i), 1, (1 + 0.5 * eps) * w))
      }
    }
    Encoding(LocalGraph.fromEdges(nextV, edges.toSeq), 0, 1, gate.toIndexedSeq)
  }

  /** Run sequential best local moves (λ=0) to convergence and read each
    * gate's truth value off its cluster (same cluster as t ⇒ true).
    */
  def solveViaLouvain(c: Circuit, seed: Long = 1): IndexedSeq[Boolean] = {
    val enc = encode(c)
    val res = repro.core.SeqLouvain.cluster(enc.graph, lambda = 0.0,
      repro.core.LouvainOptions(seed = seed, refine = false, maxLevels = 1).toConvergence)
    val cl = res.clusters
    enc.gateVertex.map(g => cl(g) == cl(enc.tVertex))
  }
}
