package repro.dataflow

import org.apache.spark.sql.DataFrame

/** Lineage truncation for iterative dataflow.
  *
  * `Dataset.localCheckpoint()` truncates the *plan* but the resulting
  * `LogicalRDD` inherits the ORIGINAL plan's statistics. Catalyst's
  * size-only join estimate is the product of child sizes, so inherited stats
  * compound multiplicatively across loop rounds until they are million-bit
  * BigIntegers and the optimizer (runtime-filter injection, broadcast
  * selection) spends minutes on bignum arithmetic. Rebuilding the frame from
  * the checkpointed RDD resets statistics to the flat default each round.
  */
object Lineage {

  /** Materialize `df` and return an equivalent frame with fresh lineage AND
    * fresh (default) statistics.
    */
  def cut(df: DataFrame): DataFrame = {
    val spark = df.sparkSession
    val ck    = df.localCheckpoint()
    spark.createDataFrame(ck.rdd, df.schema)
  }
}
