package repro.core

import org.apache.spark.sql.functions._
import org.scalacheck.{Gen, Prop}
import repro.SparkSpec
import repro.TestUtil.checkProp
import repro.graphs.GraphData

class DedupSpec extends SparkSpec {

  private def dfOf(tuples: Seq[Vector[Long]], arity: Int) =
    GraphData.tuplesToDF(spark, tuples, arity)

  private def collect(df: org.apache.spark.sql.DataFrame): Set[Vector[Long]] =
    df.collect().map(r => Vector.tabulate(r.size)(i => r.getLong(i))).toSet

  test("canPack boundaries per arity") {
    assert(Dedup.canPack(1, (1L << 62)))
    assert(Dedup.canPack(1, Long.MaxValue)) // identity pack: any non-negative fits
    assert(Dedup.canPack(2, (1L << 31) - 1))
    assert(!Dedup.canPack(2, 1L << 31))
    assert(Dedup.canPack(3, (1L << 21) - 1))
    assert(!Dedup.canPack(3, 1L << 21))
    assert(!Dedup.canPack(4, 1L))
    assert(!Dedup.canPack(2, -1L))
  }

  test("property: pack/unpack roundtrip for arity 2") {
    checkProp(Prop.forAll(
      Gen.chooseNum(0L, (1L << 31) - 1), Gen.chooseNum(0L, (1L << 31) - 1)) { (a, b) =>
      val df = dfOf(Seq(Vector(a, b)), 2)
      val packed = df.select(Dedup.packExpr(2).as("ck"))
      val back = packed.select(Dedup.unpackExprs(2, col("ck")): _*)
      collect(back) == Set(Vector(a, b))
    }, minTests = 30)
  }

  test("property: pack is injective for arity 2") {
    checkProp(Prop.forAll(
      Gen.chooseNum(0L, (1L << 31) - 1), Gen.chooseNum(0L, (1L << 31) - 1),
      Gen.chooseNum(0L, (1L << 31) - 1), Gen.chooseNum(0L, (1L << 31) - 1)) { (a, b, c, d) =>
      val pack: (Long, Long) => Long = (x, y) => (x << 31) | y
      ((a, b) == (c, d)) == (pack(a, b) == pack(c, d))
    }, minTests = 50)
  }

  test("pack/unpack roundtrip for arity 1 and 3") {
    val df1 = dfOf(Seq(Vector(123456789L)), 1)
    assert(collect(df1.select(Dedup.packExpr(1).as("ck"))
      .select(Dedup.unpackExprs(1, col("ck")): _*)) == Set(Vector(123456789L)))
    val t3 = Vector((1L << 21) - 1, 0L, 77L)
    val df3 = dfOf(Seq(t3), 3)
    assert(collect(df3.select(Dedup.packExpr(3).as("ck"))
      .select(Dedup.unpackExprs(3, col("ck")): _*)) == Set(t3))
  }

  test("fast dedup removes duplicates") {
    val base = Seq(Vector(1L, 2L), Vector(2L, 3L), Vector(1L, 2L), Vector(1L, 2L))
    val out = Dedup.fast(dfOf(base, 2), numPartitions = 4)
    assert(collect(out) == Set(Vector(1L, 2L), Vector(2L, 3L)))
  }

  test("generic dedup removes duplicates") {
    val base = Seq(Vector(1L, 2L), Vector(2L, 3L), Vector(1L, 2L))
    val out = Dedup.generic(dfOf(base, 2), numPartitions = 4)
    assert(collect(out) == Set(Vector(1L, 2L), Vector(2L, 3L)))
  }

  test("fast and generic dedup agree on random input") {
    val rnd = new scala.util.Random(5)
    val tuples = Seq.fill(5000)(Vector(rnd.nextInt(50).toLong, rnd.nextInt(50).toLong))
    val df = dfOf(tuples, 2)
    assert(collect(Dedup.fast(df, 8)) == collect(Dedup.generic(df, 8)))
  }

  test("dispatch uses generic path when values are too large to pack") {
    val big = Seq(Vector(1L << 40, 2L), Vector(1L << 40, 2L))
    val out = Dedup(dfOf(big, 2), fastEnabled = true, maxValue = 1L << 40, numPartitions = 2)
    assert(collect(out) == Set(Vector(1L << 40, 2L)))
  }

  test("dispatch honors fastEnabled = false") {
    val out = Dedup(dfOf(Seq(Vector(1L, 1L), Vector(1L, 1L)), 2),
      fastEnabled = false, maxValue = 10L, numPartitions = 2)
    assert(collect(out) == Set(Vector(1L, 1L)))
  }

  test("fast dedup with zero values (empty-sentinel interaction)") {
    val base = Seq(Vector(0L, 0L), Vector(0L, 0L), Vector(0L, 1L))
    val out = Dedup.fast(dfOf(base, 2), 2)
    assert(collect(out) == Set(Vector(0L, 0L), Vector(0L, 1L)))
  }

  test("fast dedup preserves 5k distinct keys across partitions") {
    val tuples = (1 to 5000).map(i => Vector(i.toLong, (i % 97).toLong))
    val withDups = tuples ++ tuples
    val out = Dedup.fast(dfOf(withDups, 2), 16)
    assert(out.count() == 5000)
  }
}
