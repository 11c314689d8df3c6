package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.TestUtil.checkProp

class LongHashSetSpec extends AnyFunSuite {

  test("add returns true only on first insert") {
    val s = new LongHashSet()
    assert(s.add(7L))
    assert(!s.add(7L))
    assert(s.size == 1)
  }

  test("contains reflects inserts") {
    val s = new LongHashSet()
    (0L until 100L).foreach(s.add)
    assert((0L until 100L).forall(s.contains))
    assert(!s.contains(100L))
  }

  test("grows past initial capacity") {
    val s = new LongHashSet(8)
    val n = 10000
    (0 until n).foreach(i => assert(s.add(i.toLong * 7919)))
    assert(s.size == n)
    (0 until n).foreach(i => assert(s.contains(i.toLong * 7919)))
  }

  test("iterator yields exactly the inserted keys") {
    val s = new LongHashSet()
    val keys = Set(1L, 5L, 9L, 1L << 40, Long.MaxValue)
    keys.foreach(s.add)
    assert(s.iterator.toSet == keys)
  }

  test("zero is a valid key (distinct from the empty sentinel)") {
    val s = new LongHashSet()
    assert(s.add(0L))
    assert(s.contains(0L))
    assert(!s.add(0L))
  }

  test("rejects negative keys") {
    val s = new LongHashSet()
    assertThrows[IllegalArgumentException](s.add(-1L))
  }

  test("property: behaves like Set[Long] on random workloads") {
    checkProp(Prop.forAll(Gen.listOf(Gen.chooseNum(0L, Long.MaxValue))) { (xs: List[Long]) =>
      val s = new LongHashSet()
      val ref = scala.collection.mutable.Set.empty[Long]
      xs.forall(x => s.add(x) == ref.add(x)) &&
        s.size == ref.size && s.iterator.toSet == ref.toSet
    })
  }

  test("property: adversarial keys sharing low bits") {
    val s = new LongHashSet(16)
    val keys = (0 until 5000).map(i => i.toLong << 32)
    keys.foreach(k => assert(s.add(k)))
    assert(s.size == 5000)
    keys.foreach(k => assert(s.contains(k)))
  }
}
