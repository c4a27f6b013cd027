package repro.blocking

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Block Filtering [Papadakis et al., EDBT 2016]: remove every entity from
  * the largest 20% of the blocks in which it appears — equivalently, keep
  * each entity in its ⌈ratio·|B_i|⌉ smallest blocks (ratio = 0.8 in the
  * paper). Block size ties are broken deterministically by block key so the
  * output is reproducible across runs and against the DuckDB oracle.
  */
object BlockFiltering {

  val DefaultRatio = 0.8

  /** @param eb (eid, src, bid) entity-block assignments
    * @param ratio fraction of each entity's (smallest) blocks to keep
    */
  def apply(eb: DataFrame, ratio: Double = DefaultRatio): DataFrame = {
    require(ratio > 0 && ratio <= 1, s"ratio must be in (0,1], got $ratio")
    val sizes = eb.groupBy("bid").agg(count(lit(1)).as("bSizeF"))
    val w = Window.partitionBy("eid").orderBy(col("bSizeF").asc, col("bid").asc)
    eb.join(sizes, "bid")
      .withColumn("rnk", row_number().over(w))
      .withColumn("nBlocks", count(lit(1)).over(Window.partitionBy("eid")))
      .filter(col("rnk") <= ceil(col("nBlocks") * ratio))
      .select("eid", "src", "bid")
  }
}
