package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport

class BitmapSpec extends AnyFunSuite with PropSupport {

  test("of/get/cardinality") {
    val b = Bitmap.of(10, Seq(0, 3, 9))
    assert(b.get(0) && b.get(3) && b.get(9))
    assert(!b.get(1) && !b.get(8))
    assert(b.cardinality == 3)
  }

  test("empty bitmap") {
    val b = Bitmap.empty(100)
    assert(b.cardinality == 0)
    assert(b.setBits.isEmpty)
  }

  test("and computes joint presence (Algorithm 1 line 8)") {
    val b1 = Bitmap.of(8, Seq(0, 1, 2, 5))
    val b2 = Bitmap.of(8, Seq(1, 2, 6))
    val j = b1 and b2
    assert(j.setBits.toSeq == Seq(1, 2))
    assert(j.cardinality == 2)
  }

  test("and requires equal sizes") {
    assertThrows[IllegalArgumentException](Bitmap.of(8, Nil) and Bitmap.of(9, Nil))
  }

  test("out-of-range bits rejected") {
    assertThrows[IllegalArgumentException](Bitmap.of(8, Seq(8)))
    assertThrows[IllegalArgumentException](Bitmap.of(8, Seq(3)).get(8))
  }

  test("works across word boundaries (>64 bits)") {
    val idx = Seq(0, 63, 64, 65, 127, 128)
    val b = Bitmap.of(200, idx)
    assert(b.setBits.toSeq == idx)
    assert(b.cardinality == idx.size)
  }

  test("equality and hashCode") {
    assert(Bitmap.of(10, Seq(1, 2)) == Bitmap.of(10, Seq(2, 1)))
    assert(Bitmap.of(10, Seq(1, 2)).hashCode == Bitmap.of(10, Seq(1, 2)).hashCode)
    assert(Bitmap.of(10, Seq(1)) != Bitmap.of(10, Seq(2)))
    assert(Bitmap.of(10, Seq(1)) != Bitmap.of(11, Seq(1)))
  }

  private val setsGen = for {
    n <- Gen.choose(1, 300)
    a <- Gen.listOf(Gen.choose(0, n - 1))
    b <- Gen.listOf(Gen.choose(0, n - 1))
  } yield (n, a.toSet, b.toSet)

  test("property: cardinality/setBits/and agree with Set semantics") {
    checkProp(Prop.forAll(setsGen) { case (n, a, b) =>
      val ba = Bitmap.of(n, a); val bb = Bitmap.of(n, b)
      ba.cardinality == a.size &&
        ba.setBits.toSet == a &&
        (ba and bb).setBits.toSet == a.intersect(b)
    })
  }
}
