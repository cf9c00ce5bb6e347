package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers
import repro.TestGraphs
import repro.graph.LocalGraph

class CompressSpec extends AnyFunSuite with Matchers {

  private val EPS = 1e-9

  test("compressing a triangle into one cluster yields a single self-loop vertex") {
    val g = LocalGraph.fromUnweightedEdges(3, Seq((0, 1), (1, 2), (0, 2)))
    val c = Compress.compress(g, Array(0, 0, 0), 1)
    c.numVertices shouldBe 1
    c.numEdges shouldBe 0
    c.selfLoop(0) shouldBe 3.0 +- EPS
    c.vertexWeight(0) shouldBe 3.0 +- EPS
    c.sqWeight(0) shouldBe 3.0 +- EPS
  }

  test("inter-cluster edges are aggregated") {
    // two clusters {0,1} and {2,3}; edges across: (1,2) w=1, (0,3) w=2
    val g = LocalGraph.fromEdges(4, Seq((0, 1, 1.0), (2, 3, 1.0), (1, 2, 1.0), (0, 3, 2.0)))
    val c = Compress.compress(g, Array(0, 0, 1, 1), 2)
    c.numVertices shouldBe 2
    c.numEdges shouldBe 1
    c.wgts(c.offsets(0)) shouldBe 3.0 +- EPS
    c.selfLoop(0) shouldBe 1.0 +- EPS
    c.selfLoop(1) shouldBe 1.0 +- EPS
  }

  test("pre-existing self-loops accumulate through compression") {
    val g0 = LocalGraph.fromEdges(2, Seq((0, 0, 5.0), (0, 1, 1.0)))
    val c  = Compress.compress(g0, Array(0, 0), 1)
    c.selfLoop(0) shouldBe 6.0 +- EPS
  }

  test("compression preserves the CC objective exactly (sequential)") {
    for (seed <- 1 to 15) {
      val n  = 10 + seed
      val g  = TestGraphs.randomWeighted(n, 0.3, seed)
      val cl = Objective.normalize(TestGraphs.randomClustering(n, 4, seed + 1))
      val nC = cl.max + 1
      val lambda = 0.05 * (1 + seed % 15)
      val base   = Objective.cc(g, cl, lambda)
      val comp   = Compress.compress(g, cl, nC)
      // On the compressed graph each super-vertex as its own cluster must give
      // the same objective value.
      val idCl = Array.tabulate(nC)(identity)
      Objective.cc(comp, idCl, lambda) shouldBe base +- 1e-8
    }
  }

  test("objective preserved under further clustering of the compressed graph") {
    for (seed <- 1 to 10) {
      val n  = 16
      val g  = TestGraphs.randomWeighted(n, 0.4, seed)
      val cl = Objective.normalize(TestGraphs.randomClustering(n, 6, seed + 2))
      val nC = cl.max + 1
      val lambda = 0.3
      val comp  = Compress.compress(g, cl, nC)
      val cl2   = Objective.normalize(TestGraphs.randomClustering(nC, 3, seed + 5))
      val flat  = Compress.flatten(cl, cl2)
      Objective.cc(comp, cl2, lambda) shouldBe Objective.cc(g, flat, lambda) +- 1e-8
    }
  }

  test("parallel compression matches sequential") {
    for (seed <- 1 to 8) {
      val n  = 200
      val g  = TestGraphs.randomWeighted(n, 0.05, seed)
      val cl = Objective.normalize(TestGraphs.randomClustering(n, 20, seed))
      val nC = cl.max + 1
      val s  = Compress.compress(g, cl, nC, threads = 1)
      val p  = Compress.compress(g, cl, nC, threads = 8)
      p.numVertices shouldBe s.numVertices
      p.numEdges shouldBe s.numEdges
      p.undirectedEdges.map { case (a, b, w) => (a, b, math.round(w * 1e9)) }.sorted shouldBe
        s.undirectedEdges.map { case (a, b, w) => (a, b, math.round(w * 1e9)) }.sorted
      p.selfLoop.zip(s.selfLoop).foreach { case (a, b) => a shouldBe b +- EPS }
      p.vertexWeight.zip(s.vertexWeight).foreach { case (a, b) => a shouldBe b +- EPS }
    }
  }

  test("vertex weights and sq weights are summed per cluster") {
    val g = LocalGraph.fromUnweightedEdges(4, Seq((0, 1), (2, 3)))
      .withVertexWeights(Array(1.0, 2.0, 3.0, 4.0))
    val c = Compress.compress(g, Array(0, 0, 1, 1), 2)
    c.vertexWeight.toSeq shouldBe Seq(3.0, 7.0)
    c.sqWeight.toSeq shouldBe Seq(5.0, 25.0)
  }

  test("flatten composes clusterings") {
    val dense = Array(0, 1, 0, 2)
    val comp  = Array(5, 5, 7)
    Compress.flatten(dense, comp).toSeq shouldBe Seq(5, 5, 5, 7)
  }

  test("flatten parallel matches sequential") {
    val n = 5000
    val dense = TestGraphs.randomClustering(n, 50, 1)
    val comp  = TestGraphs.randomClustering(50, 7, 2)
    Compress.flatten(dense, comp, 8).toSeq shouldBe Compress.flatten(dense, comp, 1).toSeq
  }
}
