package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers

class GraphGenSpec extends AnyFunSuite with Matchers {

  test("rMAT is deterministic in its seed") {
    val g1 = GraphGen.rmat(scale = 8, numEdges = 2000, seed = 5)
    val g2 = GraphGen.rmat(scale = 8, numEdges = 2000, seed = 5)
    g1.undirectedEdges shouldBe g2.undirectedEdges
  }

  test("rMAT edge count is close to requested after dedupe") {
    val g = GraphGen.rmat(scale = 12, numEdges = 10000, seed = 5)
    g.numEdges should be <= 10000L
    g.numEdges should be >= 8000L
  }

  test("rMAT skews edges toward low vertex ids (a=0.5 quadrant)") {
    val g = GraphGen.rmat(scale = 10, numEdges = 8000, seed = 9)
    val n = g.numVertices
    val lowHalfDeg = (0 until n / 2).map(g.degree).sum
    val highHalfDeg = (n / 2 until n).map(g.degree).sum
    (lowHalfDeg * 10) should be > 12 * highHalfDeg
  }

  test("sbm covers every vertex with a community") {
    val gt = GraphGen.sbm(n = 500, minSize = 5, maxSize = 40, dIn = 6, dOut = 2, seed = 3)
    gt.membership.length shouldBe 500
    gt.communities.map(_.length).sum shouldBe 500
    // membership and communities agree
    gt.communities.zipWithIndex.foreach { case (comm, _) =>
      val ids = comm.map(gt.membership(_)).toSet
      ids.size shouldBe 1
    }
  }

  test("sbm communities are denser inside than outside") {
    val gt = GraphGen.sbm(n = 2000, minSize = 20, maxSize = 60, dIn = 8, dOut = 2, seed = 3)
    val g  = gt.graph
    var intra = 0L; var inter = 0L
    g.undirectedEdges.foreach { case (u, v, _) =>
      if (gt.membership(u) == gt.membership(v)) intra += 1 else inter += 1
    }
    intra should be > inter
  }

  test("sbm communities are sorted by decreasing size") {
    val gt = GraphGen.sbm(n = 1000, minSize = 5, maxSize = 200, dIn = 6, dOut = 1, seed = 13)
    val sizes = gt.communities.map(_.length)
    sizes shouldBe sizes.sortBy(-(_: Int))
  }

  test("sbm hub overlay adds high-degree vertices") {
    val plain = GraphGen.sbm(n = 3000, minSize = 10, maxSize = 50, dIn = 5, dOut = 1, seed = 7)
    val hubby = GraphGen.sbm(n = 3000, minSize = 10, maxSize = 50, dIn = 5, dOut = 1, seed = 7,
                             hubs = 3, hubDegree = 500)
    hubby.graph.maxDegree should be > plain.graph.maxDegree + 200
  }

  test("presets exist for all six paper graphs") {
    // Just the two smallest here (others are bench-scale).
    val a = GraphGen.preset("amazon-lite")
    a.graph.numVertices shouldBe 40000
    a.graph.numEdges should be > 100000L
    val d = GraphGen.preset("dblp-lite")
    d.graph.numVertices shouldBe 40000
    an[IllegalArgumentException] should be thrownBy GraphGen.preset("nope")
  }

  test("karate has 34 vertices and 78 edges") {
    val g = GraphGen.karate
    g.numVertices shouldBe 34
    g.numEdges shouldBe 78L
  }

  test("star graph structure") {
    val g = GraphGen.star(5, 0.5)
    g.numVertices shouldBe 6
    g.degree(0) shouldBe 5
    (1 to 5).foreach(g.degree(_) shouldBe 1)
    g.totalEdgeWeight shouldBe 2.5 +- 1e-12
  }
}
