package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers

class ParallelSpec extends AnyFunSuite with Matchers {

  test("forRange covers every index exactly once") {
    val n = 10000
    val hits = new java.util.concurrent.atomic.AtomicIntegerArray(n)
    Parallel.forRange(n, 8)(i => hits.incrementAndGet(i))
    (0 until n).foreach(i => hits.get(i) shouldBe 1)
  }

  test("forRange with single thread runs inline") {
    var sum = 0L
    Parallel.forRange(100, 1)(i => sum += i)
    sum shouldBe 4950L
  }

  test("forRange handles n=0 and negative") {
    Parallel.forRange(0, 4)(_ => fail("should not run"))
    Parallel.forRange(-5, 4)(_ => fail("should not run"))
  }

  test("forRange propagates exceptions") {
    an[Exception] should be thrownBy
      Parallel.forRange(10000, 4)(i => if (i == 5000) throw new IllegalStateException("boom"))
  }

  test("mapReduceRange computes a parallel sum") {
    val n = 100000
    val total = Parallel.mapReduceRange[Array[Long]](n, 8)(() => Array(0L)) {
      (acc, i) => acc(0) += i
    } { (a, b) => a(0) += b(0); a }
    total(0) shouldBe n.toLong * (n - 1) / 2
  }

  test("mapReduceRange sequential path matches parallel") {
    val n = 5000
    def run(threads: Int) = Parallel.mapReduceRange[Array[Double]](n, threads)(() => Array(0.0)) {
      (acc, i) => acc(0) += math.sqrt(i.toDouble)
    } { (a, b) => a(0) += b(0); a }
    run(1)(0) shouldBe run(8)(0) +- 1e-6
  }
}

class AtomicDoubleArraySpec extends AnyFunSuite with Matchers {

  test("get/set round trip") {
    val a = new AtomicDoubleArray(4)
    a.set(2, 3.25)
    a.get(2) shouldBe 3.25
    a.get(0) shouldBe 0.0
  }

  test("concurrent adds are lossless") {
    val a = new AtomicDoubleArray(2)
    Parallel.forRange(100000, 8)(_ => a.add(0, 1.0))
    a.get(0) shouldBe 100000.0
  }

  test("add of negative values") {
    val a = new AtomicDoubleArray(1)
    a.add(0, 5.5); a.add(0, -2.25)
    a.get(0) shouldBe 3.25
  }

  test("toArray snapshots all slots") {
    val a = new AtomicDoubleArray(3)
    a.set(0, 1); a.set(1, 2); a.set(2, 3)
    a.toArray.toSeq shouldBe Seq(1.0, 2.0, 3.0)
  }
}

class PrimitiveMapsSpec extends AnyFunSuite with Matchers {

  test("IntDoubleMap addTo accumulates") {
    val m = new IntDoubleMap(4)
    m.addTo(7, 1.5); m.addTo(7, 2.5); m.addTo(3, 1.0)
    m.getOrElse(7, 0) shouldBe 4.0
    m.getOrElse(3, 0) shouldBe 1.0
    m.getOrElse(99, -1) shouldBe -1.0
    m.size shouldBe 2
  }

  test("IntDoubleMap grows past initial capacity") {
    val m = new IntDoubleMap(2)
    (0 until 1000).foreach(i => m.addTo(i, i.toDouble))
    m.size shouldBe 1000
    (0 until 1000).foreach(i => m.getOrElse(i, -1) shouldBe i.toDouble)
  }

  test("IntDoubleMap clear resets in O(entries)") {
    val m = new IntDoubleMap(8)
    (0 until 100).foreach(i => m.addTo(i, 1.0))
    m.clear()
    m.size shouldBe 0
    m.getOrElse(5, -1) shouldBe -1.0
    m.addTo(5, 2.0)
    m.getOrElse(5, -1) shouldBe 2.0
  }

  test("IntDoubleMap foreachEntry visits all entries") {
    val m = new IntDoubleMap(4)
    (0 until 50).foreach(i => m.addTo(i * 3, i.toDouble))
    var count = 0; var sum = 0.0
    m.foreachEntry((_, v) => { count += 1; sum += v })
    count shouldBe 50
    sum shouldBe (0 until 50).sum.toDouble
  }

  test("LongDoubleMap basic operations and growth") {
    val m = new LongDoubleMap(4)
    (0L until 2000L).foreach(i => m.addTo(i << 20, 2.0))
    m.size shouldBe 2000
    m.getOrElse(5L << 20, -1) shouldBe 2.0
    m.getOrElse(12345678L, -1) shouldBe -1.0
  }

  test("LongDoubleMap rejects negative keys") {
    an[IllegalArgumentException] should be thrownBy new LongDoubleMap(4).addTo(-1L, 1.0)
  }

  test("LongDoubleMap mergeFrom combines values") {
    val a = new LongDoubleMap(4); val b = new LongDoubleMap(4)
    a.addTo(1L, 1.0); a.addTo(2L, 2.0)
    b.addTo(2L, 3.0); b.addTo(9L, 9.0)
    a.mergeFrom(b)
    a.getOrElse(1L, 0) shouldBe 1.0
    a.getOrElse(2L, 0) shouldBe 5.0
    a.getOrElse(9L, 0) shouldBe 9.0
    a.size shouldBe 3
  }
}
