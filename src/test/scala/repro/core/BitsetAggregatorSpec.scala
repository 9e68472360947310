package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.util.BitVector

class BitsetAggregatorSpec extends AnyFunSuite {

  private val agg = new BitsetAggregator(128)

  test("zero buffer is all clear with the right length") {
    val z = agg.zero
    assert(z.length == BitVector.bytesFor(128))
    assert(z.forall(_ == 0))
  }

  test("reduce sets the requested bit") {
    val buf = agg.reduce(agg.zero, 0)
    assert(BitVector.fromBytes(128, buf).setBits.toSeq == Seq(0))
    val buf2 = agg.reduce(buf, 127)
    assert(BitVector.fromBytes(128, buf2).setBits.toSeq == Seq(0, 127))
  }

  test("reduce is idempotent per position") {
    val buf = agg.reduce(agg.reduce(agg.zero, 5), 5)
    assert(BitVector.fromBytes(128, buf).cardinality == 1)
  }

  test("reduce rejects out-of-range positions") {
    intercept[IllegalArgumentException](agg.reduce(agg.zero, 128))
    intercept[IllegalArgumentException](agg.reduce(agg.zero, -1))
  }

  test("merge ORs buffers") {
    val a = agg.reduce(agg.zero, 1)
    val b = agg.reduce(agg.zero, 100)
    val m = agg.merge(a, b)
    assert(BitVector.fromBytes(128, m).setBits.toSeq == Seq(1, 100))
  }

  test("merge with zero is identity") {
    val a = agg.reduce(agg.zero, 42)
    val m = agg.merge(a.clone(), agg.zero)
    assert(m.toSeq == a.toSeq)
  }

  test("finish passes the buffer through") {
    val a = agg.reduce(agg.zero, 9)
    assert(agg.finish(a) sameElements a)
  }

  test("fold order does not matter (commutative monoid)") {
    val positions = Seq(3, 77, 3, 120, 0, 77)
    val left = positions.foldLeft(agg.zero)(agg.reduce)
    val right = positions.reverse.foldLeft(agg.zero)(agg.reduce)
    assert(left.toSeq == right.toSeq)
    // and splitting into partial buffers + merge gives the same result
    val (p1, p2) = positions.splitAt(3)
    val merged = agg.merge(p1.foldLeft(agg.zero)(agg.reduce),
                           p2.foldLeft(agg.zero)(agg.reduce))
    assert(merged.toSeq == left.toSeq)
  }

  test("constructor rejects non-positive m") {
    intercept[IllegalArgumentException](new BitsetAggregator(0))
  }
}
