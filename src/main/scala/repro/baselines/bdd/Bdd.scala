package repro.baselines.bdd

import scala.collection.mutable

/** A from-scratch reduced ordered binary decision diagram (ROBDD) package —
  * the substrate BDDBDDB [26] builds on. Nodes are hash-consed in a unique
  * table; AND/OR/DIFF go through a memoized apply; EXISTS quantifies a
  * variable set; RENAME handles arbitrary injective variable maps via a
  * memoized ITE rebuild (safe even for non-monotone maps such as column
  * swaps).
  *
  * Terminals: 0 = FALSE, 1 = TRUE. Variable ids are ints in [0, numVars);
  * smaller id = closer to the root.
  */
final class Bdd(val numVars: Int) {

  val False = 0
  val True = 1

  private var varArr = new Array[Int](1024)
  private var loArr = new Array[Int](1024)
  private var hiArr = new Array[Int](1024)
  private var nodeCount = 2
  varArr(0) = Int.MaxValue; varArr(1) = Int.MaxValue // terminals sort last

  private val unique = new mutable.HashMap[(Int, Int, Int), Int]()
  private val applyCache = new mutable.HashMap[(Int, Int, Int), Int]()
  private val iteCache = new mutable.HashMap[(Int, Int, Int), Int]()

  def size: Int = nodeCount
  def variable(n: Int): Int = varArr(n)
  def low(n: Int): Int = loArr(n)
  def high(n: Int): Int = hiArr(n)

  /** Hash-consed node constructor with the reduction rule lo == hi. */
  def mk(v: Int, lo: Int, hi: Int): Int = {
    require(v >= 0 && v < numVars, s"variable $v out of range")
    if (lo == hi) lo
    else unique.getOrElseUpdate((v, lo, hi), {
      if (nodeCount == varArr.length) grow()
      val id = nodeCount
      varArr(id) = v; loArr(id) = lo; hiArr(id) = hi
      nodeCount += 1
      id
    })
  }

  private def grow(): Unit = {
    varArr = java.util.Arrays.copyOf(varArr, varArr.length * 2)
    loArr = java.util.Arrays.copyOf(loArr, loArr.length * 2)
    hiArr = java.util.Arrays.copyOf(hiArr, hiArr.length * 2)
  }

  /** The single-variable function v. */
  def ithVar(v: Int): Int = mk(v, False, True)

  // ------------------------------------------------------------- apply ops

  private final val OpAnd = 0
  private final val OpOr = 1
  private final val OpDiff = 2

  def and(a: Int, b: Int): Int = applyOp(OpAnd, a, b)
  def or(a: Int, b: Int): Int = applyOp(OpOr, a, b)
  /** a ∧ ¬b — the set difference of the encoded relations. */
  def diff(a: Int, b: Int): Int = applyOp(OpDiff, a, b)
  def not(a: Int): Int = diff(True, a)

  // Deep recursions can run for minutes on adversarial inputs; honor thread
  // interrupts so the bench harness can enforce timeouts (BDDBDDB-style
  // blowups are *expected* on dense graphs).
  private var opCounter = 0
  private def checkInterrupt(): Unit = {
    opCounter += 1
    if ((opCounter & 0xFFFFF) == 0 && Thread.currentThread().isInterrupted)
      throw new RuntimeException(new InterruptedException("BDD operation interrupted"))
  }

  private def applyOp(op: Int, a: Int, b: Int): Int = {
    checkInterrupt()
    val t = terminalCase(op, a, b)
    if (t >= 0) return t
    applyCache.getOrElseUpdate((op, a, b), {
      val va = varArr(a); val vb = varArr(b)
      val v = math.min(va, vb)
      val (a0, a1) = if (va == v) (loArr(a), hiArr(a)) else (a, a)
      val (b0, b1) = if (vb == v) (loArr(b), hiArr(b)) else (b, b)
      mk(v, applyOp(op, a0, b0), applyOp(op, a1, b1))
    })
  }

  private def terminalCase(op: Int, a: Int, b: Int): Int = op match {
    case OpAnd =>
      if (a == False || b == False) False
      else if (a == True) b
      else if (b == True) a
      else if (a == b) a
      else -1
    case OpOr =>
      if (a == True || b == True) True
      else if (a == False) b
      else if (b == False) a
      else if (a == b) a
      else -1
    case OpDiff =>
      if (a == False || b == True) False
      else if (b == False) a
      else if (a == b) False
      else -1
    case _ => -1
  }

  // -------------------------------------------------------------- exists

  /** Existential quantification of every variable in `vars`. */
  def exists(a: Int, vars: Set[Int]): Int = {
    val memo = new mutable.HashMap[Int, Int]()
    def go(n: Int): Int = {
      if (n <= True) return n
      memo.getOrElseUpdate(n, {
        val v = varArr(n)
        val lo = go(loArr(n)); val hi = go(hiArr(n))
        if (vars.contains(v)) or(lo, hi) else mk(v, lo, hi)
      })
    }
    go(a)
  }

  // ----------------------------------------------------------------- ite

  /** If-then-else: f ? g : h, correct for any variable order of the inputs. */
  def ite(f: Int, g: Int, h: Int): Int = {
    if (f == True) return g
    if (f == False) return h
    if (g == h) return g
    if (g == True && h == False) return f
    checkInterrupt()
    val key = (f, g, h)
    iteCache.getOrElseUpdate(key, {
      val v = math.min(varArr(f), math.min(varArr(g), varArr(h)))
      def cof(n: Int, hiSide: Boolean): Int =
        if (n <= True || varArr(n) != v) n else if (hiSide) hiArr(n) else loArr(n)
      mk(v, ite(cof(f, false), cof(g, false), cof(h, false)),
            ite(cof(f, true), cof(g, true), cof(h, true)))
    })
  }

  /** Rename variables by an injective map (identity where unmapped). The
    * ITE-based rebuild tolerates non-monotone maps (column swaps).
    */
  def rename(a: Int, map: Map[Int, Int]): Int = {
    val memo = new mutable.HashMap[Int, Int]()
    def go(n: Int): Int = {
      if (n <= True) return n
      memo.getOrElseUpdate(n, {
        val v = map.getOrElse(varArr(n), varArr(n))
        ite(ithVar(v), go(hiArr(n)), go(loArr(n)))
      })
    }
    go(a)
  }

  // ---------------------------------------------------------- model count

  /** Number of satisfying assignments over exactly the variables in `vars`
    * (every variable of `a` must be in `vars`).
    */
  def satCount(a: Int, vars: Set[Int]): Long = {
    val sorted = vars.toArray.sorted
    val rank = sorted.zipWithIndex.toMap
    val memo = new mutable.HashMap[Int, Long]()
    def go(n: Int): Long =
      if (n == False) 0L
      else if (n == True) 1L
      else memo.getOrElseUpdate(n, {
        val lo = go(loArr(n)) * skip(loArr(n), varArr(n))
        val hi = go(hiArr(n)) * skip(hiArr(n), varArr(n))
        lo + hi
      })
    // 2^(number of vars strictly between parent and child levels)
    def skip(child: Int, parentVar: Int): Long = {
      val childRank = if (child <= True) sorted.length else rank(varArr(child))
      1L << (childRank - rank(parentVar) - 1)
    }
    if (a == False) 0L
    else if (a == True) 1L << sorted.length
    else go(a) * (1L << rank(varArr(a)))
  }

  /** Enumerate satisfying assignments restricted to `vars` (each assignment
    * as var -> boolean; free variables are expanded).
    */
  def foreachSat(a: Int, vars: Seq[Int])(f: Map[Int, Boolean] => Unit): Unit = {
    val sorted = vars.sorted
    def go(n: Int, idx: Int, acc: Map[Int, Boolean]): Unit = {
      if (n == False) return
      if (idx == sorted.length) { if (n == True) f(acc); return }
      val v = sorted(idx)
      if (n != True && varArr(n) == v) {
        go(loArr(n), idx + 1, acc.updated(v, false))
        go(hiArr(n), idx + 1, acc.updated(v, true))
      } else if (n == True || varArr(n) > v) {
        // free variable at this level: expand both branches
        go(n, idx + 1, acc.updated(v, false))
        go(n, idx + 1, acc.updated(v, true))
      } else {
        // node variable not in vars — should not happen for relation BDDs
        throw new IllegalStateException(s"node variable ${varArr(n)} not in enumeration set")
      }
    }
    go(a, 0, Map.empty)
  }
}
