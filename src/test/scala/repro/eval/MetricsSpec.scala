package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers

class MetricsSpec extends AnyFunSuite with Matchers {

  test("perfect clustering gives precision=recall=1") {
    val comms    = Seq(Array(0, 1, 2), Array(3, 4))
    val clusters = Array(0, 0, 0, 1, 1)
    val pr = Metrics.averagePrecisionRecall(comms, clusters)
    pr.precision shouldBe 1.0 +- 1e-12
    pr.recall shouldBe 1.0 +- 1e-12
  }

  test("one giant cluster gives recall 1, low precision") {
    val comms    = Seq(Array(0, 1), Array(2, 3, 4))
    val clusters = Array(0, 0, 0, 0, 0)
    val pr = Metrics.averagePrecisionRecall(comms, clusters)
    pr.recall shouldBe 1.0 +- 1e-12
    pr.precision shouldBe ((2.0 / 5 + 3.0 / 5) / 2) +- 1e-12
  }

  test("all singletons give precision 1, low recall") {
    val comms    = Seq(Array(0, 1, 2, 3))
    val clusters = Array(0, 1, 2, 3)
    val pr = Metrics.averagePrecisionRecall(comms, clusters)
    pr.precision shouldBe 1.0 +- 1e-12
    pr.recall shouldBe 0.25 +- 1e-12
  }

  test("topK limits evaluated communities") {
    val comms = Seq(Array(0, 1, 2), Array(3, 4)) // ordered by size
    val clusters = Array(0, 0, 0, 1, 2)
    val top1 = Metrics.averagePrecisionRecall(comms, clusters, topK = 1)
    top1.precision shouldBe 1.0 +- 1e-12
    top1.recall shouldBe 1.0 +- 1e-12
  }

  test("a cluster can match multiple communities (Tectonic methodology)") {
    val comms    = Seq(Array(0, 1), Array(2, 3))
    val clusters = Array(0, 0, 0, 0) // one cluster matched by both
    val pr = Metrics.averagePrecisionRecall(comms, clusters)
    pr.precision shouldBe 0.5 +- 1e-12
    pr.recall shouldBe 1.0 +- 1e-12
  }

  test("f1 harmonic mean") {
    Metrics.PrecisionRecall(1.0, 0.5).f1 shouldBe (2 * 1.0 * 0.5 / 1.5) +- 1e-12
    Metrics.PrecisionRecall(0.0, 0.0).f1 shouldBe 0.0
  }

  test("ARI of identical partitions is 1") {
    val a = Array(0, 0, 1, 1, 2, 2)
    Metrics.ari(a, a) shouldBe 1.0 +- 1e-12
    // label permutation does not matter
    val b = Array(5, 5, 9, 9, 1, 1)
    Metrics.ari(a, b) shouldBe 1.0 +- 1e-12
  }

  test("ARI of independent random partitions is near 0") {
    val rng = new java.util.SplittableRandom(1)
    val n = 5000
    val a = Array.fill(n)(rng.nextInt(5))
    val b = Array.fill(n)(rng.nextInt(5))
    math.abs(Metrics.ari(a, b)) should be < 0.03
  }

  test("ARI known small examples (hand-computed)") {
    // a=[0,0,1,1], b=[0,0,0,1]: sumIJ=1, sumA=2, sumB=3, E=1, max=2.5 ⇒ ARI=0
    Metrics.ari(Array(0, 0, 1, 1), Array(0, 0, 0, 1)) shouldBe 0.0 +- 1e-9
    // a=[0,0,0,1,1,1], b=[0,0,1,1,1,1]: sumIJ=4, sumA=6, sumB=7, E=2.8,
    // max=6.5 ⇒ ARI = 1.2/3.7
    Metrics.ari(Array(0, 0, 0, 1, 1, 1), Array(0, 0, 1, 1, 1, 1)) shouldBe
      (1.2 / 3.7) +- 1e-9
  }

  test("NMI of identical partitions is 1") {
    val a = Array(0, 1, 1, 2, 2, 2)
    Metrics.nmi(a, a) shouldBe 1.0 +- 1e-12
  }

  test("NMI of constant vs varied partition is 0") {
    val a = Array(0, 0, 0, 0)
    val b = Array(0, 1, 2, 3)
    Metrics.nmi(a, b) shouldBe 0.0 +- 1e-12
  }

  test("NMI of independent partitions is near 0") {
    val rng = new java.util.SplittableRandom(2)
    val n = 5000
    val a = Array.fill(n)(rng.nextInt(4))
    val b = Array.fill(n)(rng.nextInt(4))
    Metrics.nmi(a, b) should be < 0.01
  }

  test("NMI is symmetric") {
    val a = Array(0, 0, 1, 1, 2, 2, 0, 1)
    val b = Array(1, 1, 1, 0, 0, 2, 2, 2)
    Metrics.nmi(a, b) shouldBe Metrics.nmi(b, a) +- 1e-12
  }
}
