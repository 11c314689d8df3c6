package repro.pbme

import java.util.concurrent.atomic.AtomicLongArray

/** A dense n×n bit matrix over the active domain {1..n} (§5.3). Row/column
  * index 0 is unused so vertex ids map directly. Two flavors:
  *
  *  - [[BitMatrix]]: plain `Array[Long]` rows. Safe when every row is
  *    written by a single thread (the TC kernel's zero-coordination
  *    partitioning — Algorithm 2).
  *  - [[AtomicBitMatrix]]: CAS-based test-and-set. Needed by the SG kernel
  *    (Algorithm 3), where derived pairs land in rows owned by other
  *    threads.
  */
final class BitMatrix(val n: Int) {
  val words: Int = (n + 1 + 63) >>> 6
  private val rows: Array[Array[Long]] = Array.ofDim[Long](n + 1, words)

  def get(i: Int, j: Int): Boolean = (rows(i)(j >>> 6) & (1L << (j & 63))) != 0L

  def set(i: Int, j: Int): Unit = rows(i)(j >>> 6) |= (1L << (j & 63))

  /** Set bit (i,j); returns true iff it was previously clear. */
  def testAndSet(i: Int, j: Int): Boolean = {
    val w = j >>> 6
    val m = 1L << (j & 63)
    val old = rows(i)(w)
    rows(i)(w) = old | m
    (old & m) == 0L
  }

  def row(i: Int): Array[Long] = rows(i)

  /** OR `other`'s row `src` into this matrix's row `dst`. */
  def orRow(dst: Int, srcRow: Array[Long]): Unit = {
    val r = rows(dst)
    var w = 0
    while (w < words) { r(w) |= srcRow(w); w += 1 }
  }

  def clear(i: Int, j: Int): Unit = rows(i)(j >>> 6) &= ~(1L << (j & 63))

  /** Number of set bits in row i. */
  def rowCardinality(i: Int): Long = {
    var c = 0L; var w = 0
    val r = rows(i)
    while (w < words) { c += java.lang.Long.bitCount(r(w)); w += 1 }
    c
  }

  def cardinality: Long = (1 to n).map(rowCardinality(_)).sum

  /** Iterate set column indices of row i. */
  def foreachInRow(i: Int)(f: Int => Unit): Unit = {
    val r = rows(i)
    var w = 0
    while (w < words) {
      var bits = r(w)
      while (bits != 0L) {
        val j = (w << 6) + java.lang.Long.numberOfTrailingZeros(bits)
        f(j)
        bits &= bits - 1
      }
      w += 1
    }
  }

  /** All set (row, col) pairs as an iterator (for materialization). */
  def tuples: Iterator[(Long, Long)] =
    (1 to n).iterator.flatMap { i =>
      val buf = new scala.collection.mutable.ArrayBuffer[(Long, Long)]
      foreachInRow(i)(j => buf += ((i.toLong, j.toLong)))
      buf
    }
}

/** Flat CAS bit matrix for kernels where multiple threads may write the same
  * row (SG). `testAndSet` is lock-free: the winning CAS claims the fact.
  */
final class AtomicBitMatrix(val n: Int) {
  val words: Int = (n + 1 + 63) >>> 6
  private val bits = new AtomicLongArray((n + 1) * words)

  def get(i: Int, j: Int): Boolean =
    (bits.get(i * words + (j >>> 6)) & (1L << (j & 63))) != 0L

  /** Atomically set bit (i,j); returns true iff this call set it. */
  def testAndSet(i: Int, j: Int): Boolean = {
    val idx = i * words + (j >>> 6)
    val m = 1L << (j & 63)
    var old = bits.get(idx)
    while ((old & m) == 0L) {
      if (bits.compareAndSet(idx, old, old | m)) return true
      old = bits.get(idx)
    }
    false
  }

  def cardinality: Long = {
    var c = 0L
    var i = 0
    while (i < bits.length()) { c += java.lang.Long.bitCount(bits.get(i)); i += 1 }
    c
  }

  def foreachInRow(i: Int)(f: Int => Unit): Unit = {
    var w = 0
    while (w < words) {
      var x = bits.get(i * words + w)
      while (x != 0L) {
        val j = (w << 6) + java.lang.Long.numberOfTrailingZeros(x)
        f(j)
        x &= x - 1
      }
      w += 1
    }
  }

  def tuples: Iterator[(Long, Long)] =
    (1 to n).iterator.flatMap { i =>
      val buf = new scala.collection.mutable.ArrayBuffer[(Long, Long)]
      foreachInRow(i)(j => buf += ((i.toLong, j.toLong)))
      buf
    }
}
