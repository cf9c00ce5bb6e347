package repro.core

import repro.graph.LocalGraph
import repro.util.{LongDoubleMap, Parallel}

/** Graph compression (PARALLEL-COMPRESS / SEQUENTIAL-COMPRESS) and cluster
  * flattening (paper §3.1 and appendix B).
  *
  * Compression contracts each cluster into one super-vertex: inter-cluster
  * edges are aggregated by (cluster(u), cluster(v)); intra-cluster weight and
  * pre-existing self-loops accumulate into the super-vertex's `selfLoop`;
  * vertex weights (and the Σk² bookkeeping) are summed. This preserves the CC
  * objective exactly: for any clustering C' of the compressed graph,
  * CC(flatten(C, C')) on G equals CC(C') on G'.
  */
object Compress {

  /** Compress `g` by `clusters`, which must be dense ids in [0, numClusters).
    *
    * @param threads 1 ⇒ sequential aggregation (SEQ-*, NetworKit stand-in);
    *                >1 ⇒ per-chunk hash aggregation merged in a tree, the
    *                work-efficient scheme the paper credits for its NetworKit
    *                speedup.
    */
  def compress(g: LocalGraph, clusters: Array[Int], numClusters: Int,
               threads: Int = 1): LocalGraph = {
    val n = g.numVertices
    require(clusters.length == n)

    // Aggregate undirected edges once (u < v); key packs (min(cu,cv), max).
    // Diagonal keys (c,c) carry intra-cluster weight.
    val merged: LongDoubleMap =
      if (threads <= 1) {
        val m = new LongDoubleMap(math.max(64, g.nbrs.length / 2))
        var v = 0
        while (v < n) {
          val cv = clusters(v)
          var i  = g.offsets(v)
          while (i < g.offsets(v + 1)) {
            val u = g.nbrs(i)
            if (v < u) {
              val cu = clusters(u)
              val lo = math.min(cv, cu); val hi = math.max(cv, cu)
              m.addTo(lo.toLong << 32 | hi, g.wgts(i))
            }
            i += 1
          }
          if (g.selfLoop(v) != 0) m.addTo(cv.toLong << 32 | cv, g.selfLoop(v))
          v += 1
        }
        m
      } else {
        Parallel.mapReduceRange[LongDoubleMap](n, threads)(() => new LongDoubleMap(1024)) { (m, v) =>
          val cv = clusters(v)
          var i  = g.offsets(v)
          while (i < g.offsets(v + 1)) {
            val u = g.nbrs(i)
            if (v < u) {
              val cu = clusters(u)
              val lo = math.min(cv, cu); val hi = math.max(cv, cu)
              m.addTo(lo.toLong << 32 | hi, g.wgts(i))
            }
            i += 1
          }
          if (g.selfLoop(v) != 0) m.addTo(cv.toLong << 32 | cv, g.selfLoop(v))
        }(_ mergeFrom _)
      }

    // Vertex-side aggregation: k', Σk'², self-loops from the diagonal.
    val kOut  = new Array[Double](numClusters)
    val sqOut = new Array[Double](numClusters)
    val slOut = new Array[Double](numClusters)
    var v = 0
    while (v < n) {
      val c = clusters(v)
      kOut(c) += g.vertexWeight(v)
      sqOut(c) += g.sqWeight(v)
      v += 1
    }

    // CSR build from merged map.
    val deg = new Array[Int](numClusters)
    merged.foreachEntry { (key, _) =>
      val a = (key >>> 32).toInt; val b = (key & 0xffffffffL).toInt
      if (a == b) () else { deg(a) += 1; deg(b) += 1 }
    }
    val offsets = new Array[Int](numClusters + 1)
    var c = 0
    while (c < numClusters) { offsets(c + 1) = offsets(c) + deg(c); c += 1 }
    val pos  = offsets.clone()
    val nbrs = new Array[Int](offsets(numClusters))
    val wgts = new Array[Double](offsets(numClusters))
    merged.foreachEntry { (key, w) =>
      val a = (key >>> 32).toInt; val b = (key & 0xffffffffL).toInt
      if (a == b) slOut(a) += w
      else {
        nbrs(pos(a)) = b; wgts(pos(a)) = w; pos(a) += 1
        nbrs(pos(b)) = a; wgts(pos(b)) = w; pos(b) += 1
      }
    }
    new LocalGraph(numClusters, offsets, nbrs, wgts, kOut, slOut, sqOut)
  }

  /** PARALLEL-FLATTEN: compose clustering `dense` of level-l vertices with the
    * clustering `comp` of the compressed graph's vertices.
    */
  def flatten(dense: Array[Int], comp: Array[Int], threads: Int = 1): Array[Int] = {
    val out = new Array[Int](dense.length)
    Parallel.forRange(dense.length, threads)(v => out(v) = comp(dense(v)))
    out
  }
}
