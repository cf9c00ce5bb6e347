package repro.graph

import repro.util.LongDoubleMap

/** Immutable CSR representation of an undirected weighted graph, possibly a
  * *compressed* (coarsened) graph in which each vertex stands for a cluster of
  * original vertices.
  *
  * Every undirected edge {u,v}, u≠v, appears twice in the adjacency
  * (u→v and v→u) with the same weight. Self-loops are NOT stored as adjacency
  * entries; intra-super-vertex weight accumulated by coarsening lives in
  * `selfLoop` so the exact CC objective is computable at any level.
  *
  * @param vertexWeight  k_v of the LambdaCC objective (1 for CC, degree for
  *                      modularity, sum of constituents after coarsening)
  * @param selfLoop      total original edge weight contracted inside v
  * @param sqWeight      Σ of original k² contained in v (exact negative term)
  */
final class LocalGraph(
    val numVertices: Int,
    val offsets: Array[Int],
    val nbrs: Array[Int],
    val wgts: Array[Double],
    val vertexWeight: Array[Double],
    val selfLoop: Array[Double],
    val sqWeight: Array[Double],
) {
  require(offsets.length == numVertices + 1, "offsets must have n+1 entries")
  require(nbrs.length == offsets(numVertices), "nbrs length must equal offsets(n)")

  /** Number of undirected edges. */
  def numEdges: Long = nbrs.length / 2L

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Σ of incident edge weights (no self-loop contribution). */
  def weightedDegree(v: Int): Double = {
    var s = 0.0; var i = offsets(v)
    while (i < offsets(v + 1)) { s += wgts(i); i += 1 }
    s
  }

  /** Total undirected edge weight, self-loops included. */
  def totalEdgeWeight: Double = {
    var s = 0.0; var i = 0
    while (i < wgts.length) { s += wgts(i); i += 1 }
    var v = 0; var sl = 0.0
    while (v < numVertices) { sl += selfLoop(v); v += 1 }
    s / 2 + sl
  }

  def maxDegree: Int = {
    var m = 0; var v = 0
    while (v < numVertices) { m = math.max(m, degree(v)); v += 1 }
    m
  }

  /** Copy with different vertex weights (k² tracked accordingly).
    * Used to switch the same topology between CC (k=1) and modularity (k=deg).
    */
  def withVertexWeights(k: Array[Double]): LocalGraph = {
    require(k.length == numVertices)
    new LocalGraph(numVertices, offsets, nbrs, wgts, k, selfLoop, k.map(x => x * x))
  }

  /** Modularity-style weights: k_v = weighted degree + 2·selfLoop. */
  def withDegreeWeights: LocalGraph = {
    val k = Array.tabulate(numVertices)(v => weightedDegree(v) + 2 * selfLoop(v))
    withVertexWeights(k)
  }

  /** Estimated retained bytes of the CSR arrays (paper's Fig-8 denominator is
    * CSR bytes; we account both sides of the comparison the same way).
    */
  def sizeInBytes: Long =
    4L * offsets.length + 4L * nbrs.length + 8L * wgts.length +
      8L * vertexWeight.length + 8L * selfLoop.length + 8L * sqWeight.length

  /** Undirected edge list (u < v), for Spark/DuckDB interop and tests. */
  def undirectedEdges: Seq[(Int, Int, Double)] = {
    val buf = Seq.newBuilder[(Int, Int, Double)]
    var u = 0
    while (u < numVertices) {
      var i = offsets(u)
      while (i < offsets(u + 1)) {
        val v = nbrs(i)
        if (u < v) buf += ((u, v, wgts(i)))
        i += 1
      }
      u += 1
    }
    buf.result()
  }
}

object LocalGraph {

  /** Build from an undirected edge list; duplicate {u,v} pairs are combined by
    * summing weights; self-loops in the input are accumulated into `selfLoop`.
    * Vertex weights default to 1 (the CC objective's default k).
    */
  def fromEdges(numVertices: Int, edges: IterableOnce[(Int, Int, Double)]): LocalGraph = {
    val agg      = new LongDoubleMap(1024)
    val selfLoop = new Array[Double](numVertices)
    val it       = edges.iterator
    while (it.hasNext) {
      val (u, v, w) = it.next()
      require(u >= 0 && u < numVertices && v >= 0 && v < numVertices, s"edge ($u,$v) out of range")
      if (u == v) selfLoop(u) += w
      else {
        val (a, b) = if (u < v) (u, v) else (v, u)
        agg.addTo(a.toLong * numVertices + b, w)
      }
    }
    val deg = new Array[Int](numVertices)
    agg.foreachEntry { (k, _) =>
      val a = (k / numVertices).toInt; val b = (k % numVertices).toInt
      deg(a) += 1; deg(b) += 1
    }
    val offsets = new Array[Int](numVertices + 1)
    var v = 0
    while (v < numVertices) { offsets(v + 1) = offsets(v) + deg(v); v += 1 }
    val pos  = offsets.clone()
    val nbrs = new Array[Int](offsets(numVertices))
    val wgts = new Array[Double](offsets(numVertices))
    agg.foreachEntry { (k, w) =>
      val a = (k / numVertices).toInt; val b = (k % numVertices).toInt
      nbrs(pos(a)) = b; wgts(pos(a)) = w; pos(a) += 1
      nbrs(pos(b)) = a; wgts(pos(b)) = w; pos(b) += 1
    }
    val k  = Array.fill(numVertices)(1.0)
    val sq = Array.fill(numVertices)(1.0)
    new LocalGraph(numVertices, offsets, nbrs, wgts, k, selfLoop, sq)
  }

  /** Build from unweighted undirected pairs. */
  def fromUnweightedEdges(numVertices: Int, edges: IterableOnce[(Int, Int)]): LocalGraph =
    fromEdges(numVertices, edges.iterator.map { case (u, v) => (u, v, 1.0) })
}
