package repro.pcomp

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers
import CircuitReduction._

class CircuitReductionSpec extends AnyFunSuite with Matchers {

  test("circuit evaluation: basic gates") {
    val c = Circuit(IndexedSeq(
      Input(true), Input(false),
      And(0, 1), // false
      Or(0, 1),  // true
      And(0, 3), // true
      Or(1, 2),  // false
    ))
    c.evaluate shouldBe IndexedSeq(true, false, false, true, true, false)
  }

  test("topological-order violation is rejected") {
    an[IllegalArgumentException] should be thrownBy
      Circuit(IndexedSeq(And(0, 1), Input(true), Input(false)))
  }

  test("louvain solves a single OR gate") {
    for ((a, b) <- Seq((true, true), (true, false), (false, true), (false, false))) {
      val c = Circuit(IndexedSeq(Input(a), Input(b), Or(0, 1)))
      CircuitReduction.solveViaLouvain(c) shouldBe c.evaluate
    }
  }

  test("louvain solves a single AND gate") {
    for ((a, b) <- Seq((true, true), (true, false), (false, true), (false, false))) {
      val c = Circuit(IndexedSeq(Input(a), Input(b), And(0, 1)))
      CircuitReduction.solveViaLouvain(c) shouldBe c.evaluate
    }
  }

  test("louvain solves two-level circuits") {
    val c = Circuit(IndexedSeq(
      Input(true), Input(false), Input(true),
      And(0, 1), Or(1, 2), And(2, 4), Or(3, 5),
    ))
    CircuitReduction.solveViaLouvain(c) shouldBe c.evaluate
  }

  test("louvain solves random monotone circuits (appendix D end-to-end)") {
    for (seed <- 1 to 12) {
      val rng = new SplittableRandom(seed)
      val nIn = 3 + rng.nextInt(3)
      val nGates = 4 + rng.nextInt(8)
      val nodes = IndexedSeq.newBuilder[Node]
      (0 until nIn).foreach(_ => nodes += Input(rng.nextBoolean()))
      var total = nIn
      (0 until nGates).foreach { _ =>
        val a = rng.nextInt(total); val b = rng.nextInt(total)
        nodes += (if (rng.nextBoolean()) And(a, b) else Or(a, b))
        total += 1
      }
      val c = Circuit(nodes.result())
      withClue(s"seed=$seed: ") {
        CircuitReduction.solveViaLouvain(c, seed) shouldBe c.evaluate
      }
    }
  }
}
