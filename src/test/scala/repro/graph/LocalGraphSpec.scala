package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers

class LocalGraphSpec extends AnyFunSuite with Matchers {

  test("builds a triangle with symmetric adjacency") {
    val g = LocalGraph.fromUnweightedEdges(3, Seq((0, 1), (1, 2), (0, 2)))
    g.numVertices shouldBe 3
    g.numEdges shouldBe 3
    (0 until 3).foreach(v => g.degree(v) shouldBe 2)
    g.totalEdgeWeight shouldBe 3.0 +- 1e-12
  }

  test("duplicate edges are combined by summing weights") {
    val g = LocalGraph.fromEdges(2, Seq((0, 1, 1.0), (1, 0, 2.5)))
    g.numEdges shouldBe 1
    g.wgts(g.offsets(0)) shouldBe 3.5 +- 1e-12
    g.totalEdgeWeight shouldBe 3.5 +- 1e-12
  }

  test("input self-loops go to selfLoop, not adjacency") {
    val g = LocalGraph.fromEdges(2, Seq((0, 0, 4.0), (0, 1, 1.0)))
    g.degree(0) shouldBe 1
    g.selfLoop(0) shouldBe 4.0 +- 1e-12
    g.totalEdgeWeight shouldBe 5.0 +- 1e-12
  }

  test("default vertex weights are 1 with sq=1") {
    val g = LocalGraph.fromUnweightedEdges(4, Seq((0, 1), (2, 3)))
    g.vertexWeight.toSeq shouldBe Seq(1.0, 1.0, 1.0, 1.0)
    g.sqWeight.toSeq shouldBe Seq(1.0, 1.0, 1.0, 1.0)
  }

  test("withDegreeWeights sets k to weighted degree") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1, 2.0), (1, 2, 3.0)))
    val gd = g.withDegreeWeights
    gd.vertexWeight.toSeq shouldBe Seq(2.0, 5.0, 3.0)
    gd.sqWeight.toSeq shouldBe Seq(4.0, 25.0, 9.0)
  }

  test("weightedDegree sums incident weights") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1, 2.0), (0, 2, 0.5)))
    g.weightedDegree(0) shouldBe 2.5 +- 1e-12
    g.weightedDegree(1) shouldBe 2.0 +- 1e-12
  }

  test("undirectedEdges round-trips through fromEdges") {
    val edges = Seq((0, 3, 1.5), (1, 2, 2.0), (0, 1, 0.25))
    val g     = LocalGraph.fromEdges(4, edges)
    g.undirectedEdges.sorted shouldBe edges.map { case (u, v, w) => (u, v, w) }.sorted
  }

  test("isolated vertices have degree zero") {
    val g = LocalGraph.fromUnweightedEdges(5, Seq((0, 1)))
    g.degree(4) shouldBe 0
    g.numEdges shouldBe 1
  }

  test("maxDegree") {
    val g = GraphGen.star(7)
    g.maxDegree shouldBe 7
  }

  test("edge out of range is rejected") {
    an[IllegalArgumentException] should be thrownBy
      LocalGraph.fromUnweightedEdges(2, Seq((0, 2)))
  }

  test("sizeInBytes accounts CSR arrays") {
    val g = LocalGraph.fromUnweightedEdges(3, Seq((0, 1), (1, 2)))
    // offsets 4*(n+1) + nbrs 4*2m + wgts 8*2m + k/selfLoop/sq 8n each
    g.sizeInBytes shouldBe (4L * 4 + 4L * 4 + 8L * 4 + 3 * 8L * 3)
  }
}
