package repro.dataflow

import org.apache.spark.sql.functions._
import org.scalatest.matchers.should.Matchers
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.Objective
import repro.graph.{GraphGen, Triangles}

class SparkGraphOpsSpec extends SparkSpec with Matchers {

  test("edgesDf/verticesDf round-trip counts") {
    val g  = TestGraphs.randomWeighted(40, 0.2, 1)
    val e  = SparkGraphOps.edgesDf(spark, g)
    val v  = SparkGraphOps.verticesDf(spark, g)
    e.count() shouldBe g.numEdges
    v.count() shouldBe g.numVertices.toLong
  }

  test("canonicalize folds directions and sums duplicates (DuckDB oracle)") {
    import spark.implicits._
    val raw = Seq((1L, 2L, 1.0), (2L, 1L, 2.0), (3L, 3L, 9.0), (2L, 3L, 0.5))
      .toDF("src", "dst", "weight")
    val canon = SparkGraphOps.canonicalize(raw)
      .select($"src", $"dst", round($"weight", 6) as "weight")
    Oracle.assertEquivalent(
      canon,
      """SELECT least(src::BIGINT, dst::BIGINT) AS src,
        |       greatest(src::BIGINT, dst::BIGINT) AS dst,
        |       round(sum(weight::DOUBLE), 6) AS weight
        |FROM raw WHERE src <> dst
        |GROUP BY 1, 2""".stripMargin,
      "raw" -> raw)
  }

  test("clusterWeights matches DuckDB aggregation") {
    import spark.implicits._
    val vertices = Seq((0L, 1.0), (1L, 2.0), (2L, 3.0), (3L, 1.5)).toDF("id", "k")
    val assign   = Seq((0L, 0L), (1L, 0L), (2L, 1L), (3L, 1L)).toDF("id", "cid")
    val kc = SparkGraphOps.clusterWeights(vertices, assign)
      .select($"cid", round($"kc", 6) as "kc")
    Oracle.assertEquivalent(
      kc,
      """SELECT a.cid::BIGINT AS cid, round(sum(v.k::DOUBLE), 6) AS kc
        |FROM vertices v JOIN assign a ON v.id = a.id
        |GROUP BY 1""".stripMargin,
      "vertices" -> vertices, "assign" -> assign)
  }

  test("ccObjective equals the local objective on random graphs") {
    for (seed <- 1 to 4) {
      val g  = TestGraphs.randomWeighted(50, 0.15, seed)
      val cl = TestGraphs.randomClustering(50, 6, seed)
      val lambda = 0.2 + 0.1 * seed
      import spark.implicits._
      val assign = cl.zipWithIndex.map { case (c, v) => (v.toLong, c.toLong) }
        .toSeq.toDF("id", "cid")
      val dfObj = SparkGraphOps.ccObjective(
        SparkGraphOps.edgesDf(spark, g), SparkGraphOps.verticesDf(spark, g), assign, lambda)
      dfObj shouldBe Objective.cc(g, cl, lambda) +- 1e-8
    }
  }

  test("ccObjective intra-weight term matches DuckDB") {
    import spark.implicits._
    val g  = TestGraphs.randomWeighted(30, 0.2, 7)
    val cl = TestGraphs.randomClustering(30, 4, 7)
    val edges  = SparkGraphOps.edgesDf(spark, g)
    val assign = cl.zipWithIndex.map { case (c, v) => (v.toLong, c.toLong) }
      .toSeq.toDF("id", "cid")
    val intra = edges
      .join(assign.select($"id" as "src", $"cid" as "cs"), "src")
      .join(assign.select($"id" as "dst", $"cid" as "cd"), "dst")
      .where($"cs" === $"cd")
      .agg(round(coalesce(sum("weight"), lit(0.0)), 6) as "intra")
    Oracle.assertEquivalent(
      intra,
      """SELECT round(coalesce(sum(e.weight::DOUBLE), 0), 6) AS intra
        |FROM edges e
        |JOIN assign a1 ON e.src = a1.id
        |JOIN assign a2 ON e.dst = a2.id
        |WHERE a1.cid = a2.cid""".stripMargin,
      "edges" -> edges, "assign" -> assign)
  }

  test("compressEdges matches local Compress on aggregated weights") {
    import spark.implicits._
    val g  = TestGraphs.randomWeighted(40, 0.2, 9)
    val cl = Objective.normalize(TestGraphs.randomClustering(40, 5, 9))
    val nC = cl.max + 1
    val local = repro.core.Compress.compress(g, cl, nC)
    val assign = cl.zipWithIndex.map { case (c, v) => (v.toLong, c.toLong) }
      .toSeq.toDF("id", "cid")
    val dfComp = SparkGraphOps.compressEdges(SparkGraphOps.edgesDf(spark, g), assign)
      .collect()
      .map(r => (r.getLong(0).toInt, r.getLong(1).toInt, math.round(r.getDouble(2) * 1e9)))
      .sorted
    val localEdges = local.undirectedEdges
      .map { case (u, v, w) => (u, v, math.round(w * 1e9)) }.sorted
    dfComp.toSeq shouldBe localEdges
  }

  test("edgeTriangles matches local triangle counts (and DuckDB)") {
    import spark.implicits._
    val g  = GraphGen.karate
    val edges = SparkGraphOps.edgesDf(spark, g).select("src", "dst")
    val dfTri = SparkGraphOps.edgeTriangles(edges)
    // vs local
    val tc = Triangles.count(g)
    val localPerEdge = (for {
      u <- 0 until g.numVertices
      i <- g.offsets(u) until g.offsets(u + 1)
      if u < g.nbrs(i)
    } yield ((u.toLong, g.nbrs(i).toLong), tc.perEdge(i).toLong)).toMap
    dfTri.collect().foreach { r =>
      r.getLong(2) shouldBe localPerEdge((r.getLong(0), r.getLong(1)))
    }
    // vs DuckDB
    Oracle.assertEquivalent(
      dfTri,
      """WITH e AS (SELECT src::BIGINT AS src, dst::BIGINT AS dst FROM edges),
        |tri AS (
        |  SELECT ab.src AS a, ab.dst AS b, bc.dst AS c
        |  FROM e ab JOIN e bc ON ab.dst = bc.src
        |            JOIN e ac ON ab.src = ac.src AND bc.dst = ac.dst),
        |per AS (
        |  SELECT src, dst, count(*) AS t FROM (
        |    SELECT a AS src, b AS dst FROM tri
        |    UNION ALL SELECT b, c FROM tri
        |    UNION ALL SELECT a, c FROM tri) GROUP BY 1, 2)
        |SELECT e.src, e.dst, coalesce(per.t, 0) AS tri
        |FROM e LEFT JOIN per ON e.src = per.src AND e.dst = per.dst""".stripMargin,
      "edges" -> edges)
  }

  test("connectedComponents labels components correctly") {
    import spark.implicits._
    // two triangles + an isolated vertex
    val edges = Seq((0L, 1L, 1.0), (1L, 2L, 1.0), (0L, 2L, 1.0),
                    (3L, 4L, 1.0), (4L, 5L, 1.0), (3L, 5L, 1.0))
      .toDF("src", "dst", "weight")
    val vertices = (0L to 6L).map(i => (i, 1.0)).toDF("id", "k")
    val cc = SparkGraphOps.connectedComponents(vertices, edges)
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    cc(0) shouldBe cc(1)
    cc(1) shouldBe cc(2)
    cc(3) shouldBe cc(4)
    cc(0) should not be cc(3)
    cc(6) should not be cc(0)
    cc(6) should not be cc(3)
  }

  test("connectedComponents matches UnionFind on a random graph") {
    val g = TestGraphs.randomUnweighted(60, 0.03, 11)
    val uf = new repro.graph.UnionFind(60)
    g.undirectedEdges.foreach { case (u, v, _) => uf.union(u, v) }
    val local = uf.components
    val cc = SparkGraphOps.connectedComponents(
      SparkGraphOps.verticesDf(spark, g), SparkGraphOps.edgesDf(spark, g))
      .collect().map(r => r.getLong(0).toInt -> r.getLong(1).toInt).toMap
    // same partition structure (labels may differ)
    val byLocal = (0 until 60).groupBy(local(_)).values.map(_.toSet).toSet
    val bySpark = (0 until 60).groupBy(cc(_)).values.map(_.toSet).toSet
    bySpark shouldBe byLocal
  }

  test("symmetrize doubles canonical rows") {
    val g = TestGraphs.randomWeighted(20, 0.3, 13)
    val canon = SparkGraphOps.edgesDf(spark, g)
    SparkGraphOps.symmetrize(canon).count() shouldBe 2 * canon.count()
  }
}
