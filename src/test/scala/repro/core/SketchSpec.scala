package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SketchSpec extends AnyFunSuite {
  test("empty/full basics") {
    val e = BitSketch.empty(100)
    assert(e.isEmpty && !e.isFull && e.cardinality == 0 && e.fragments.isEmpty)
    val f = BitSketch.full(100)
    assert(f.isFull && f.cardinality == 100 && f.selectivity == 1.0)
  }
  test("fromFragments/get across word boundaries") {
    val s = BitSketch.fromFragments(130, Seq(0, 63, 64, 129))
    assert(s.fragments == Seq(0, 63, 64, 129))
    assert(s.get(64) && !s.get(65) && !s.get(1))
    assert(s.cardinality == 4)
  }
  test("out-of-range fragment rejected") {
    intercept[IllegalArgumentException](BitSketch.fromFragments(10, Seq(10)))
    intercept[IllegalArgumentException](BitSketch.empty(10).get(10))
  }
  test("or is a union and does not mutate") {
    val a = BitSketch.fromFragments(70, Seq(1, 65))
    val b = BitSketch.fromFragments(70, Seq(2, 65))
    val u = a.or(b)
    assert(u.fragments == Seq(1, 2, 65))
    assert(a.fragments == Seq(1, 65) && b.fragments == Seq(2, 65))
  }
  test("or rejects different sizes") {
    intercept[IllegalArgumentException](BitSketch.empty(10).or(BitSketch.empty(11)))
  }
  test("subsetOf") {
    val a = BitSketch.fromFragments(100, Seq(3, 50))
    val b = BitSketch.fromFragments(100, Seq(3, 50, 99))
    assert(a.subsetOf(b) && !b.subsetOf(a) && a.subsetOf(a))
  }
  test("words roundtrip") {
    val a = BitSketch.fromFragments(129, Seq(0, 64, 128))
    assert(BitSketch.fromWords(129, a.toWords) == a)
    intercept[IllegalArgumentException](BitSketch.fromWords(129, new Array[Long](1)))
  }
  test("equality/hash") {
    val a = BitSketch.fromFragments(64, Seq(1, 2))
    val b = BitSketch.fromFragments(64, Seq(1, 2))
    assert(a == b && a.hashCode == b.hashCode)
    assert(a != BitSketch.fromFragments(64, Seq(1)))
    assert(a != BitSketch.fromFragments(65, Seq(1, 2)))
  }
  test("sizeInBytes matches word packing") {
    assert(BitSketch.empty(64).sizeInBytes == 8)
    assert(BitSketch.empty(65).sizeInBytes == 16)
    // a PS10000 sketch is ~1.25 KB, "10s or 100s of bytes" order
    assert(BitSketch.empty(10000).sizeInBytes == 1256)
  }
  test("random property: fragments roundtrip through or-composition") {
    val rnd = new scala.util.Random(11)
    for (_ <- 1 to 50) {
      val n = 1 + rnd.nextInt(300)
      val f1 = (0 until n).filter(_ => rnd.nextBoolean()).toSet
      val f2 = (0 until n).filter(_ => rnd.nextBoolean()).toSet
      val u = BitSketch.fromFragments(n, f1).or(BitSketch.fromFragments(n, f2))
      assert(u.fragments.toSet == (f1 ++ f2))
    }
  }
}
