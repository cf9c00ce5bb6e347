package repro.dataflow

import org.scalatest.matchers.should.Matchers
import repro.{SparkSpec, TestGraphs}
import repro.core.{LouvainOptions, Objective, ParLouvain}
import repro.graph.GraphGen

class DataflowLouvainSpec extends SparkSpec with Matchers {

  private def assignmentOf(res: DataflowLouvain.Result, n: Int): Array[Int] = {
    val m = res.assignment.collect().map(r => r.getLong(0).toInt -> r.getLong(1).toInt).toMap
    Array.tabulate(n)(m)
  }

  test("separates two cliques") {
    val g = TestGraphs.twoCliques(6)
    val res = DataflowLouvain.cluster(spark,
      SparkGraphOps.edgesDf(spark, g), SparkGraphOps.verticesDf(spark, g), lambda = 0.5)
    val cl = assignmentOf(res, g.numVertices)
    (0 until 6).map(cl).toSet.size shouldBe 1
    (6 until 12).map(cl).toSet.size shouldBe 1
    cl(0) should not be cl(6)
  }

  test("every vertex keeps an assignment through all levels") {
    val gt = GraphGen.sbm(300, 8, 25, 6, 2, seed = 3)
    val res = DataflowLouvain.cluster(spark,
      SparkGraphOps.edgesDf(spark, gt.graph), SparkGraphOps.verticesDf(spark, gt.graph),
      lambda = 0.4, numIter = 6, maxLevels = 5)
    res.assignment.count() shouldBe 300L
    res.assignment.select("id").distinct().count() shouldBe 300L
  }

  test("objective is positive and comparable to shared-memory PAR-CC") {
    val gt = GraphGen.sbm(400, 8, 25, 6, 1.5, seed = 5)
    val g  = gt.graph
    val lambda = 0.3
    val res = DataflowLouvain.cluster(spark,
      SparkGraphOps.edgesDf(spark, g), SparkGraphOps.verticesDf(spark, g),
      lambda, numIter = 8, maxLevels = 6)
    val cl = assignmentOf(res, g.numVertices)
    val oDf  = Objective.cc(g, cl, lambda)
    val oPar = Objective.cc(g,
      ParLouvain.cluster(g, lambda, LouvainOptions(seed = 1)).clusters, lambda)
    oDf should be > 0.0
    oDf should be > 0.6 * oPar // dataflow rounds are capped; quality close but below
  }

  test("dataflow assignment objective agrees between Spark and local computation") {
    val gt = GraphGen.sbm(200, 8, 25, 6, 2, seed = 7)
    val g  = gt.graph
    val lambda = 0.5
    val edges = SparkGraphOps.edgesDf(spark, g)
    val verts = SparkGraphOps.verticesDf(spark, g)
    val res = DataflowLouvain.cluster(spark, edges, verts, lambda, numIter = 5, maxLevels = 4)
    val cl = assignmentOf(res, g.numVertices)
    SparkGraphOps.ccObjective(edges, verts, res.assignment, lambda) shouldBe
      Objective.cc(g, cl, lambda) +- 1e-8
  }

  test("ground-truth recovery on an easy SBM") {
    val gt = GraphGen.sbm(400, 15, 30, 8, 1.0, seed = 9)
    val res = DataflowLouvain.cluster(spark,
      SparkGraphOps.edgesDf(spark, gt.graph), SparkGraphOps.verticesDf(spark, gt.graph),
      lambda = 0.1, numIter = 8, maxLevels = 6)
    val cl = assignmentOf(res, gt.graph.numVertices)
    repro.eval.Metrics.ari(cl, gt.membership) should be > 0.5
  }

  test("isolated vertices stay singletons") {
    import spark.implicits._
    val edges = Seq((0L, 1L, 1.0)).toDF("src", "dst", "weight")
    val verts = (0L to 3L).map((_, 1.0)).toDF("id", "k")
    val res = DataflowLouvain.cluster(spark, edges, verts, lambda = 0.5)
    val cl = assignmentOf(res, 4)
    cl(0) shouldBe cl(1)
    Set(cl(2), cl(3)).size shouldBe 2
    cl(2) should not be cl(0)
  }
}
