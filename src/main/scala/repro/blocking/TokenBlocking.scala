package repro.blocking

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Schema-agnostic Token Blocking [Papadakis et al., TKDE 2012].
  *
  * A block is created for every distinct token appearing in any attribute
  * value of any profile; the block contains every entity whose values contain
  * that token. This is the only parameter-free redundancy-positive blocking
  * method, and the one the paper uses on all datasets (§5.1).
  */
object TokenBlocking {

  /** Lowercase and split on any non-alphanumeric run; drop empty tokens. */
  val TokenPattern = "[^\\p{L}\\p{N}]+"

  /** Entity-block assignments from raw profiles.
    *
    * @param profiles (id: Long, source: Int, attr: String, value: String)
    * @return (eid: Long, src: Int, bid: String) — distinct assignments keyed
    *         by the block's token
    */
  def assign(profiles: DataFrame): DataFrame =
    profiles
      .select(
        col("id").cast("long").as("eid"),
        col("source").cast("int").as("src"),
        explode(split(lower(col("value")), TokenPattern)).as("bid"))
      .filter(length(col("bid")) > 0)
      .distinct()
}
