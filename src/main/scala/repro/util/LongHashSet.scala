package repro.util

/** Open-addressing hash set of non-negative Long keys — the per-partition
  * shard of the paper's CCK-GSCHT (§5.2, Fig. 5): the compact concatenated
  * key *is* the stored value and *is* its own hash, so no 〈key,value〉 pair
  * or chaining pointers are materialized.
  *
  * The sentinel EMPTY (-1) marks free slots, so only keys >= 0 are valid —
  * exactly the domain of compact keys packed from active-domain integers.
  */
final class LongHashSet(initialCapacity: Int = 1 << 10) {
  private val Empty = -1L
  private var cap = math.max(8, Integer.highestOneBit(initialCapacity * 2 - 1))
  private var table = Array.fill(cap)(Empty)
  private var count = 0

  def size: Int = count

  /** Insert `k` (must be >= 0); returns true if it was not already present. */
  def add(k: Long): Boolean = {
    if (k < 0) throw new IllegalArgumentException(s"negative key $k")
    if ((count + 1) * 4 > cap * 3) grow()
    var i = spread(k) & (cap - 1)
    while (true) {
      val cur = table(i)
      if (cur == Empty) { table(i) = k; count += 1; return true }
      if (cur == k) return false
      i = (i + 1) & (cap - 1)
    }
    false // unreachable
  }

  def contains(k: Long): Boolean = {
    var i = spread(k) & (cap - 1)
    while (true) {
      val cur = table(i)
      if (cur == Empty) return false
      if (cur == k) return true
      i = (i + 1) & (cap - 1)
    }
    false // unreachable
  }

  def iterator: Iterator[Long] = table.iterator.filter(_ != Empty)

  /** The key itself is used as the hash (paper §5.2); a finalizer spread
    * avoids clustering from packed keys sharing low bits.
    */
  private def spread(k: Long): Int = {
    val h = k ^ (k >>> 32)
    val x = (h ^ (h >>> 16)) * 0x85ebca6bL
    (x ^ (x >>> 13)).toInt
  }

  private def grow(): Unit = {
    val old = table
    cap *= 2
    table = Array.fill(cap)(Empty)
    count = 0
    var j = 0
    while (j < old.length) { if (old(j) != Empty) add(old(j)); j += 1 }
  }
}
