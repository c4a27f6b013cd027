package repro.blocking

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Block Purging [Papadakis et al., TKDE 2012], as described in §5.1 of the
  * paper: discard every block that contains more than half of the entity
  * profiles in the collection. Such blocks correspond to extremely frequent
  * signatures (stop words) that carry no distinguishing information.
  */
object BlockPurging {

  /** @param eb (eid, src, bid) entity-block assignments
    * @param nEntities total number of profiles (|E1| + |E2|, or |E| for dirty)
    * @return assignments with over-populated blocks removed
    */
  def apply(eb: DataFrame, nEntities: Long): DataFrame = {
    val keep = eb.groupBy("bid")
      .agg(count(lit(1)).as("bSizeP"))
      .filter(col("bSizeP") <= nEntities / 2.0)
      .select("bid")
    eb.join(keep, Seq("bid"), "left_semi").select("eid", "src", "bid")
  }
}
