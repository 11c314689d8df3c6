package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.util.LongHashSet

/** Deduplication (Algorithm 1 line 10). Two implementations:
  *
  *  - FAST-DEDUP (§5.2): tuples of small all-integer arity are packed into a
  *    single 64-bit Compact Concatenated Key; the rows are hash-partitioned
  *    on the CK (the "global" table — each partition owns a disjoint key
  *    range) and deduplicated per partition with a specialized
  *    open-addressing [[LongHashSet]] whose stored key *is* the tuple.
  *  - generic: Spark's `dropDuplicates` over all columns.
  *
  * CCK packing requires every attribute to fit its bit budget:
  * arity 1 -> 63 bits, arity 2 -> 31 bits each, arity 3 -> 21 bits each.
  */
object Dedup {

  /** Bits per attribute available for a CCK of the given arity. */
  def bitsPerAttr(arity: Int): Int = arity match {
    case 1 => 63
    case 2 => 31
    case 3 => 21
    case _ => 0
  }

  /** Can FAST-DEDUP pack relations of this arity whose values are bounded by
    * `maxValue` (inclusive)? Values must be non-negative.
    */
  def canPack(arity: Int, maxValue: Long): Boolean = {
    val b = bitsPerAttr(arity)
    // (1L << 63) overflows; (1L << 63) - 1 wraps to Long.MaxValue, which is
    // exactly the 63-bit bound we want.
    b > 0 && maxValue >= 0 && maxValue <= (1L << b) - 1
  }

  /** Pack columns c0..c{arity-1} into one CK column. */
  def packExpr(arity: Int): Column = {
    val b = bitsPerAttr(arity)
    (0 until arity)
      .map(i => shiftleft(col(s"c$i"), b * (arity - 1 - i)))
      .reduce[Column]((x, y) => x.bitwiseOR(y))
  }

  /** Unpack a CK column back into c0..c{arity-1}. */
  def unpackExprs(arity: Int, ck: Column): Seq[Column] = {
    val b = bitsPerAttr(arity)
    val mask = (1L << b) - 1
    (0 until arity).map { i =>
      val shifted = shiftright(ck, b * (arity - 1 - i))
      (if (i == 0) shifted else shifted.bitwiseAND(lit(mask))).as(s"c$i")
    }
  }

  /** FAST-DEDUP over an all-Long DataFrame with columns c0..c{n-1}.
    * `numPartitions` is the pre-allocation knob driven by OOF stats.
    */
  def fast(df: DataFrame, numPartitions: Int): DataFrame = {
    val spark = df.sparkSession
    import spark.implicits._
    val arity = df.columns.length
    val packed = df.select(packExpr(arity).as("ck")).as[Long]
    val deduped = packed
      .repartition(math.max(1, numPartitions), col("ck"))
      .mapPartitions { it =>
        val set = new LongHashSet()
        it.filter(set.add)
      }
    deduped.toDF("ck").select(unpackExprs(arity, col("ck")): _*)
  }

  /** Generic dedup (FAST-DEDUP off, or unpackable tuples). */
  def generic(df: DataFrame, numPartitions: Int): DataFrame =
    df.repartition(math.max(1, numPartitions), df.columns.map(col): _*)
      .dropDuplicates(df.columns.toIndexedSeq)

  /** Dispatch per configuration and packability. */
  def apply(df: DataFrame, fastEnabled: Boolean, maxValue: Long, numPartitions: Int): DataFrame = {
    val arity = df.columns.length
    if (fastEnabled && canPack(arity, maxValue)) fast(df, numPartitions)
    else generic(df, numPartitions)
  }
}
