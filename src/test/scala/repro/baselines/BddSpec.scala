package repro.baselines.bdd

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.TestUtil.checkProp

/** Unit tests for the from-scratch BDD package: every operation is checked
  * against brute-force truth-table evaluation over all assignments.
  */
class BddSpec extends AnyFunSuite {

  /** Evaluate a BDD node under a full assignment. */
  private def eval(bdd: Bdd, n: Int, assign: Int => Boolean): Boolean = {
    var cur = n
    while (cur > 1) cur = if (assign(bdd.variable(cur))) bdd.high(cur) else bdd.low(cur)
    cur == 1
  }

  private def allAssignments(k: Int): Seq[Int => Boolean] =
    (0 until (1 << k)).map(bits => (v: Int) => ((bits >> v) & 1) == 1)

  test("terminals and ithVar") {
    val b = new Bdd(4)
    assert(b.False == 0 && b.True == 1)
    val x1 = b.ithVar(1)
    assert(!eval(b, x1, _ => false))
    assert(eval(b, x1, v => v == 1))
  }

  test("mk reduces lo == hi") {
    val b = new Bdd(4)
    assert(b.mk(2, b.True, b.True) == b.True)
  }

  test("mk hash-conses identical nodes") {
    val b = new Bdd(4)
    assert(b.mk(1, b.False, b.True) == b.mk(1, b.False, b.True))
  }

  test("and/or/not truth tables") {
    val b = new Bdd(2)
    val x = b.ithVar(0); val y = b.ithVar(1)
    for (a <- allAssignments(2)) {
      assert(eval(b, b.and(x, y), a) == (a(0) && a(1)))
      assert(eval(b, b.or(x, y), a) == (a(0) || a(1)))
      assert(eval(b, b.diff(x, y), a) == (a(0) && !a(1)))
      assert(eval(b, b.not(x), a) == !a(0))
    }
  }

  test("property: apply ops match boolean semantics on random formulas") {
    val k = 4
    def genBdd(b: Bdd): Gen[Int] = {
      val leaf = Gen.oneOf(Gen.const(b.False), Gen.const(b.True),
        Gen.choose(0, k - 1).map(b.ithVar))
      def sized(depth: Int): Gen[Int] =
        if (depth == 0) leaf
        else Gen.frequency(
          2 -> leaf,
          3 -> (for { l <- sized(depth - 1); r <- sized(depth - 1); op <- Gen.choose(0, 2) }
            yield op match { case 0 => b.and(l, r); case 1 => b.or(l, r); case _ => b.diff(l, r) }),
        )
      sized(3)
    }
    val b = new Bdd(k)
    checkProp(Prop.forAll(genBdd(b), genBdd(b)) { (f, g) =>
      allAssignments(k).forall { a =>
        eval(b, b.and(f, g), a) == (eval(b, f, a) && eval(b, g, a)) &&
        eval(b, b.or(f, g), a) == (eval(b, f, a) || eval(b, g, a)) &&
        eval(b, b.diff(f, g), a) == (eval(b, f, a) && !eval(b, g, a))
      }
    }, minTests = 40)
  }

  test("exists quantifies out variables") {
    val b = new Bdd(3)
    val f = b.and(b.ithVar(0), b.ithVar(1)) // x0 & x1
    val ex0 = b.exists(f, Set(0))
    for (a <- allAssignments(3))
      assert(eval(b, ex0, a) == a(1)) // exists x0. x0&x1 == x1
    val exBoth = b.exists(f, Set(0, 1))
    assert(exBoth == b.True)
  }

  test("ite is a correct multiplexer") {
    val b = new Bdd(3)
    val f = b.ithVar(0); val g = b.ithVar(1); val h = b.ithVar(2)
    val r = b.ite(f, g, h)
    for (a <- allAssignments(3))
      assert(eval(b, r, a) == (if (a(0)) a(1) else a(2)))
  }

  test("rename with a monotone map") {
    val b = new Bdd(4)
    val f = b.and(b.ithVar(0), b.ithVar(1))
    val r = b.rename(f, Map(0 -> 2, 1 -> 3))
    for (a <- allAssignments(4))
      assert(eval(b, r, a) == (a(2) && a(3)))
  }

  test("rename with a swap (non-monotone map)") {
    val b = new Bdd(2)
    val f = b.diff(b.ithVar(0), b.ithVar(1)) // x0 & !x1
    val r = b.rename(f, Map(0 -> 1, 1 -> 0))
    for (a <- allAssignments(2))
      assert(eval(b, r, a) == (a(1) && !a(0)))
  }

  test("satCount over a variable set") {
    val b = new Bdd(3)
    assert(b.satCount(b.True, Set(0, 1, 2)) == 8)
    assert(b.satCount(b.False, Set(0, 1, 2)) == 0)
    assert(b.satCount(b.ithVar(1), Set(0, 1, 2)) == 4)
    val f = b.and(b.ithVar(0), b.ithVar(2))
    assert(b.satCount(f, Set(0, 1, 2)) == 2)
  }

  test("foreachSat enumerates exactly the satisfying assignments") {
    val b = new Bdd(3)
    val f = b.or(b.and(b.ithVar(0), b.ithVar(1)), b.ithVar(2))
    val got = scala.collection.mutable.Set.empty[(Boolean, Boolean, Boolean)]
    b.foreachSat(f, Seq(0, 1, 2))(m => got += ((m(0), m(1), m(2))))
    val expected = allAssignments(3)
      .filter(a => eval(b, f, a)).map(a => (a(0), a(1), a(2))).toSet
    assert(got.toSet == expected)
  }

  test("node table grows beyond the initial capacity") {
    val b = new Bdd(24)
    var acc = b.False
    val rnd = new scala.util.Random(3)
    for (_ <- 0 until 500) {
      var cube = b.True
      for (v <- (0 until 24).reverse)
        cube = if (rnd.nextBoolean()) b.mk(v, b.False, cube) else b.mk(v, cube, b.False)
      acc = b.or(acc, cube)
    }
    assert(b.size > 1024)
    assert(b.satCount(acc, (0 until 24).toSet) <= 500)
  }
}
