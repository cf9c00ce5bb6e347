package repro.dataflow

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** DF-CC: the paper's Louvain scheme expressed as distributed dataflow over
  * DataFrames (the repro target's `distributed_dataflow` band).
  *
  * Each level runs synchronous best-move rounds: per-vertex candidate scores
  * are computed with joins + aggregations from the appendix-A delta formula,
  * and a random half of improvable vertices moves per round (the standard
  * distributed-Louvain symmetry breaker replacing the shared-memory async
  * races that the paper uses — without it, the Figure-1 two-vertex
  * oscillation livelocks the synchronous dataflow). Levels end with a
  * group-by contraction (PARALLEL-COMPRESS as a relational aggregation) and
  * assignments are flattened back through joins.
  *
  * Cluster ids are vertex ids of the level graph; detaching to a fresh
  * singleton uses the id-space offset `n + id` exactly like the shared-memory
  * engines' spare ids.
  */
object DataflowLouvain {

  final case class Result(assignment: DataFrame, levels: Int, rounds: Int)

  /** Cluster a canonical undirected edge table under the CC objective.
    *
    * @param edges    canonical (src, dst, weight), src < dst
    * @param vertices (id, k) — every vertex, including isolated ones
    * @return assignment (id, cid) on the ORIGINAL vertex ids
    */
  def cluster(spark: SparkSession, edges: DataFrame, vertices: DataFrame,
              lambda: Double, numIter: Int = 8, maxLevels: Int = 8,
              seed: Long = 42): Result = {
    var curEdges = SparkGraphOps.canonicalize(edges).transform(Lineage.cut)
    var curVerts = vertices.transform(Lineage.cut)
    // assignment of ORIGINAL vertices onto current level's vertex ids
    var flat: DataFrame = vertices.select(col("id"), col("id") as "cid").transform(Lineage.cut)
    var level  = 0
    var rounds = 0
    var done   = false
    while (!done && level < maxLevels) {
      val (assign, r, moved) = level0(spark, curEdges, curVerts, lambda, numIter, seed + level * 1000)
      rounds += r
      level += 1
      if (!moved) done = true
      else {
        // densify level cluster ids to [0, nC) so they become next vertex ids
        val ids = assign.select(col("cid")).distinct()
          .withColumn("newId", row_number().over(Window.orderBy("cid")).cast("long") - 1)
        val denseAssign = assign.join(ids, "cid").select(col("id"), col("newId") as "cid")
          .transform(Lineage.cut)
        val nC = ids.count()
        val nV = curVerts.count()
        // flatten onto original vertices
        flat = flat.select(col("id"), col("cid") as "mid")
          .join(denseAssign.select(col("id") as "mid", col("cid")), "mid")
          .select("id", "cid")
          .transform(Lineage.cut)
        if (nC == nV) done = true
        else {
          curEdges = SparkGraphOps.compressEdges(curEdges, denseAssign).transform(Lineage.cut)
          curVerts = curVerts.join(denseAssign, "id")
            .groupBy(col("cid") as "id").agg(sum("k") as "k")
            .transform(Lineage.cut)
        }
      }
    }
    Result(flat, level, rounds)
  }

  /** Best-move rounds on one level; returns (assignment id→cid, rounds,
    * anyMoved). Cluster ids start as vertex ids.
    */
  private def level0(spark: SparkSession, edges: DataFrame, vertices: DataFrame,
                     lambda: Double, numIter: Int, seed: Long): (DataFrame, Int, Boolean) = {
    val n   = vertices.agg(max("id")).head.getLong(0) + 1
    val sym = SparkGraphOps.symmetrize(edges).transform(Lineage.cut)
    var assign = vertices.select(col("id"), col("id") as "cid").transform(Lineage.cut)
    var anyMoved = false
    var round = 0
    var stop  = false
    while (round < numIter && !stop) {
      val kc = SparkGraphOps.clusterWeights(vertices, assign) // (cid, kc)
      // edge weight from every vertex to every neighboring cluster
      val wTo = sym
        .join(assign.select(col("id") as "dst", col("cid") as "tc"), "dst")
        .groupBy(col("src") as "id", col("tc"))
        .agg(sum("weight") as "w")
      val self = assign.join(vertices, "id")
        .join(kc, "cid")
        .select(col("id"), col("cid"), col("k"), col("kc") as "kcur")
      val wCur = wTo.join(self.select(col("id"), col("cid") as "tc"),
                          Seq("id", "tc")).select(col("id"), col("w") as "wcur")
      // candidate deltas (appendix A): target clusters are neighbor clusters
      val cand = wTo
        .join(self, "id")
        .join(wCur, Seq("id"), "left")
        .join(kc.select(col("cid") as "tc", col("kc") as "ktgt"), "tc")
        .where(col("tc") =!= col("cid"))
        .select(col("id"), col("cid"), col("tc"),
          (col("w") - lit(lambda) * col("k") * col("ktgt")) -
            (coalesce(col("wcur"), lit(0.0)) - lit(lambda) * col("k") * col("kcur") +
              lit(lambda) * col("k") * col("k")) as "delta")
      // detach-to-singleton candidate (spare id n + id)
      val detach = self
        .join(wCur, Seq("id"), "left")
        .select(col("id"), col("cid"), (col("id") + lit(n)) as "tc",
          -(coalesce(col("wcur"), lit(0.0)) - lit(lambda) * col("k") * col("kcur") +
            lit(lambda) * col("k") * col("k")) as "delta")
      val best = cand.unionByName(detach)
        .where(col("delta") > 1e-11)
        .groupBy("id")
        .agg(max(struct(col("delta"), col("tc"))) as "best")
        .select(col("id"), col("best.tc") as "newCid")
      // symmetry breaking: a pseudo-random half moves each round
      val movers = best.where(pmod(hash(col("id"), lit(seed + round)), lit(2)) === 0)
        .transform(Lineage.cut)
      val nBest  = best.count()
      val nMoves = movers.count()
      if (nBest == 0) stop = true // no vertex wants to move at all
      else if (nMoves > 0) {
        anyMoved = true
        assign = assign.join(movers, Seq("id"), "left")
          .select(col("id"), coalesce(col("newCid"), col("cid")) as "cid")
          .transform(Lineage.cut)
      } // else: unlucky coin flips — retry with the next round's hash
      round += 1
    }
    (assign, round, anyMoved)
  }
}
