package repro.data

import org.scalatest.funsuite.AnyFunSuite

class AttributeIndexSpec extends AnyFunSuite {

  private val idx = new AttributeIndex(Array(1.0, 2.0, 2.0, 2.0, 5.0, 7.0, 7.0, 9.0))

  test("lowerBound / upperBound on duplicates") {
    assert(idx.lowerBound(2.0) == 1)
    assert(idx.upperBound(2.0) == 4)
    assert(idx.lowerBound(7.0) == 5)
    assert(idx.upperBound(7.0) == 7)
  }

  test("rankRange for a value range spanning duplicates") {
    assert(idx.rankRange(2.0, 7.0).contains((1, 6)))
  }

  test("rankRange includes all ties at the boundaries") {
    assert(idx.rankRange(2.0, 2.0).contains((1, 3)))
    assert(idx.rankRange(7.0, 7.0).contains((5, 6)))
  }

  test("rankRange between values snaps to the contained objects") {
    assert(idx.rankRange(1.5, 6.0).contains((1, 4)))
    assert(idx.rankRange(0.0, 100.0).contains((0, 7)))
  }

  test("empty value range yields None") {
    assert(idx.rankRange(3.0, 4.0).isEmpty)
    assert(idx.rankRange(10.0, 20.0).isEmpty)
    assert(idx.rankRange(-5.0, 0.5).isEmpty)
  }

  test("cardinality counts distinct values (Section 3.4's c)") {
    assert(idx.cardinality == 5)
    assert(new AttributeIndex(Array(1.0, 1.0, 1.0)).cardinality == 1)
    assert(new AttributeIndex(Array(1.0, 2.0, 3.0)).cardinality == 3)
  }

  test("unsorted input is rejected") {
    intercept[IllegalArgumentException] { new AttributeIndex(Array(2.0, 1.0)) }
  }

  test("rankRange agrees with a linear scan on random data") {
    val rnd = new java.util.Random(141)
    val values = Array.fill(200)(rnd.nextInt(40).toDouble).sorted
    val ai = new AttributeIndex(values)
    for (_ <- 0 until 100) {
      val a = rnd.nextInt(45) - 2.0; val b = a + rnd.nextInt(20)
      val expected = values.zipWithIndex.filter { case (v, _) => v >= a && v <= b }.map(_._2)
      ai.rankRange(a, b) match {
        case Some((l, r)) => assert((l to r).toSeq == expected.toSeq)
        case None => assert(expected.isEmpty)
      }
    }
  }
}
