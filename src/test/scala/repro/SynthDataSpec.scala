package repro

import org.apache.spark.sql.functions._
import org.scalatest.matchers.should.Matchers

/** Exercises the provided TPC-H-lite generators (scaffold contract). */
class SynthDataSpec extends SparkSpec with Matchers {

  test("lineitem at SF=0.001 has expected schema and row count") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    li.columns.toSet should contain allOf ("l_orderkey", "l_partkey", "l_quantity",
      "l_extendedprice", "l_discount", "l_shipdate")
    li.count() shouldBe 6000L
  }

  test("orders keys are dense 1..N") {
    val o = SynthData.orders(spark, sf = 0.001)
    o.count() shouldBe 1500L
    o.agg(min("o_orderkey"), max("o_orderkey")).head.toSeq shouldBe Seq(1L, 1500L)
  }

  test("customer and part are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.001, seed = 7).collect()
    val b = SynthData.customer(spark, 0.001, seed = 7).collect()
    a.toSeq shouldBe b.toSeq
    SynthData.part(spark, 0.001).count() shouldBe 200L
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.2)
    val top = z.where(col("k") <= 10).count()
    top.toDouble / 20000 should be > 0.3
  }

  test("uniform keys cover the range roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    counts.length shouldBe 10
    counts.min.toDouble / counts.max should be > 0.7
  }

  test("oracle agrees with Spark on a lineitem aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select("l_returnflag", "l_quantity") // project: the oracle ships rows as VARCHAR
    val agg = li.groupBy("l_returnflag")
      .agg(round(sum("l_quantity"), 4) as "total_qty",
           count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag, round(sum(l_quantity::DOUBLE), 4) AS total_qty,
        |       count(*) AS cnt
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }
}
