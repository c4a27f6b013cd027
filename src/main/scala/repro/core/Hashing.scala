package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** SplitMix64 finalizer, implemented twice: as plain Scala and as a Catalyst
  * column expression. Both operate on JVM/LongType two's-complement longs, so
  * they agree bit-for-bit — which is what lets the driver-side sweep
  * ([[LocalSweep]]) draw the *same* training samples as the DataFrame path
  * ([[Trainer.sample]]). Equality of the two implementations is unit-tested.
  */
object Hashing {

  private val C1 = 0x9E3779B97F4A7C15L
  private val C2 = 0xBF58476D1CE4E5B9L
  private val C3 = 0x94D049BB133111EBL

  /** Mix a candidate pair and a seed into one 64-bit key. */
  def pairKey(i: Long, j: Long, seed: Long): Long =
    mix(i * 0x100000001B3L + j + seed * C1)

  def mix(v0: Long): Long = {
    var z = v0 + C1
    z = (z ^ (z >>> 30)) * C2
    z = (z ^ (z >>> 27)) * C3
    z ^ (z >>> 31)
  }

  /** The same function over LongType columns. */
  def pairKeyCol(i: Column, j: Column, seed: Long): Column =
    mixCol(i * lit(0x100000001B3L) + j + lit(seed * C1))

  private def mixCol(v0: Column): Column = {
    val z0 = v0 + lit(C1)
    val z1 = z0.bitwiseXOR(shiftrightunsigned(z0, 30)) * lit(C2)
    val z2 = z1.bitwiseXOR(shiftrightunsigned(z1, 27)) * lit(C3)
    z2.bitwiseXOR(shiftrightunsigned(z2, 31))
  }
}
