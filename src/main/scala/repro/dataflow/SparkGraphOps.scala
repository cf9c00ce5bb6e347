package repro.dataflow

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.LocalGraph

/** Relational graph operations on DataFrames (Catalyst), used by the
  * distributed-dataflow Louvain (`DataflowLouvain`) and oracle-checked
  * against DuckDB in the test suite.
  *
  * Conventions: a canonical undirected edge table has columns
  * (`src` BIGINT, `dst` BIGINT, `weight` DOUBLE) with src < dst and one row
  * per edge; a symmetric edge table has both directions; a vertex table has
  * (`id`, `k`); an assignment table has (`id`, `cid`).
  */
object SparkGraphOps {

  /** Canonical undirected edge DataFrame from a LocalGraph. */
  def edgesDf(spark: SparkSession, g: LocalGraph): DataFrame = {
    import spark.implicits._
    spark.createDataset(g.undirectedEdges.map { case (u, v, w) => (u.toLong, v.toLong, w) })
      .toDF("src", "dst", "weight")
  }

  /** Vertex DataFrame (id, k) from a LocalGraph's vertex weights. */
  def verticesDf(spark: SparkSession, g: LocalGraph): DataFrame = {
    import spark.implicits._
    spark.createDataset((0 until g.numVertices).map(v => (v.toLong, g.vertexWeight(v))))
      .toDF("id", "k")
  }

  /** Canonicalize arbitrary (src,dst,weight) rows: drop self-loops, fold both
    * directions onto src < dst, and sum duplicate weights.
    */
  def canonicalize(edges: DataFrame): DataFrame =
    edges
      .where(col("src") =!= col("dst"))
      .select(
        least(col("src"), col("dst")) as "src",
        greatest(col("src"), col("dst")) as "dst",
        col("weight"))
      .groupBy("src", "dst")
      .agg(sum("weight") as "weight")

  /** Both-directions view of a canonical edge table. */
  def symmetrize(canonical: DataFrame): DataFrame =
    canonical.unionByName(
      canonical.select(col("dst") as "src", col("src") as "dst", col("weight")))

  /** CC objective of an assignment, as a relational aggregation:
    * Σ_intra w − (λ/2)(Σ_c K_c² − Σ_v k_v²).  (`assign`: id → cid.)
    */
  def ccObjective(edges: DataFrame, vertices: DataFrame, assign: DataFrame,
                  lambda: Double): Double = {
    val a = assign
    val intra = edges
      .join(a.select(col("id") as "src", col("cid") as "cs"), "src")
      .join(a.select(col("id") as "dst", col("cid") as "cd"), "dst")
      .where(col("cs") === col("cd"))
      .agg(coalesce(sum("weight"), lit(0.0)))
      .head.getDouble(0)
    val kStats = vertices.join(a, "id")
      .groupBy("cid").agg(sum("k") as "kc", sum(col("k") * col("k")) as "sq")
      .agg(sum(col("kc") * col("kc")) as "kc2", sum("sq") as "sq")
      .head
    val kc2 = kStats.getDouble(0)
    val sq  = kStats.getDouble(1)
    intra - lambda / 2 * (kc2 - sq)
  }

  /** Cluster total vertex weights K_c (cid, kc). */
  def clusterWeights(vertices: DataFrame, assign: DataFrame): DataFrame =
    vertices.join(assign, "id").groupBy("cid").agg(sum("k") as "kc")

  /** Contract a canonical edge table by an assignment: aggregated
    * inter-cluster edges (canonical on cluster ids), self-loops dropped.
    */
  def compressEdges(edges: DataFrame, assign: DataFrame): DataFrame =
    canonicalize(
      edges
        .join(assign.select(col("id") as "src", col("cid") as "cs"), "src")
        .join(assign.select(col("id") as "dst", col("cid") as "cd"), "dst")
        .select(col("cs") as "src", col("cd") as "dst", col("weight")))

  /** Triangles per canonical edge: (src, dst, tri). Edges not in any triangle
    * are kept with tri = 0.
    */
  def edgeTriangles(edges: DataFrame): DataFrame = {
    val e = edges.select("src", "dst")
    // enumerate each triangle a<b<c once
    val tri = e.as("ab")
      .join(e.as("bc"), col("ab.dst") === col("bc.src"))
      .join(e.as("ac"), col("ab.src") === col("ac.src") && col("bc.dst") === col("ac.dst"))
      .select(col("ab.src") as "a", col("ab.dst") as "b", col("bc.dst") as "c")
    val perEdge = tri.select(col("a") as "src", col("b") as "dst")
      .unionByName(tri.select(col("b") as "src", col("c") as "dst"))
      .unionByName(tri.select(col("a") as "src", col("c") as "dst"))
      .groupBy("src", "dst").agg(count(lit(1)) as "tri")
    e.join(perEdge, Seq("src", "dst"), "left")
      .select(col("src"), col("dst"), coalesce(col("tri"), lit(0L)) as "tri")
  }

  /** Connected components by iterative min-label propagation over the
    * symmetric edge view; returns (id, cid) where cid is the component's
    * minimum vertex id. Suitable for moderate diameters (the thresholded
    * TECTONIC graphs); a capped iteration count guards pathological chains.
    */
  def connectedComponents(vertices: DataFrame, edges: DataFrame,
                          maxIter: Int = 50): DataFrame = {
    val spark = vertices.sparkSession
    val sym   = symmetrize(canonicalize(edges)).select("src", "dst").transform(Lineage.cut)
    var labels = vertices.select(col("id"), col("id") as "cid").transform(Lineage.cut)
    var changed = 1L
    var iter = 0
    while (changed > 0 && iter < maxIter) {
      val nbrMin = sym
        .join(labels.select(col("id") as "dst", col("cid") as "nlabel"), "dst")
        .groupBy(col("src") as "id").agg(min("nlabel") as "nmin")
      val next = labels.join(nbrMin, Seq("id"), "left")
        .select(col("id"),
          least(col("cid"), coalesce(col("nmin"), col("cid"))) as "cid")
        .transform(Lineage.cut)
      changed = next.join(labels.select(col("id"), col("cid") as "old"), "id")
        .where(col("cid") =!= col("old")).count()
      labels = next
      iter += 1
    }
    labels
  }
}
