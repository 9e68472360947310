package repro.core

import org.apache.spark.sql.{Encoder, Encoders}
import org.apache.spark.sql.expressions.Aggregator

import repro.util.BitVector

/** Typed Spark aggregator that ORs Bloom bit positions into an m-bit set.
  *
  * This is the distributed construction kernel (DESIGN.md S9): the corpus is
  * exploded to (column, position) rows, grouped by column, and this aggregator
  * folds each group into the column's Bloom bit array. Catalyst runs it with
  * map-side partial aggregation, so each input partition builds partial
  * filters locally and the shuffle only moves m-bit buffers — the
  * "embarrassingly parallel" build the paper describes (partial Bloom filters
  * merge by bitwise OR, so construction parallelises perfectly).
  *
  * Buffers and output use the little-endian byte layout of
  * [[repro.util.BitVector.toBytes]] (Encoders.BINARY keeps the aggregation
  * state a plain byte array — no bespoke encoders on the wire).
  *
  * @param mBits Bloom filter size in bits (uniform across the index's columns)
  */
final class BitsetAggregator(mBits: Int)
    extends Aggregator[Int, Array[Byte], Array[Byte]] {
  require(mBits > 0, s"mBits must be > 0, got $mBits")

  override def zero: Array[Byte] = new Array[Byte](BitVector.bytesFor(mBits))

  override def reduce(buf: Array[Byte], pos: Int): Array[Byte] = {
    if (pos < 0 || pos >= mBits)
      throw new IllegalArgumentException(s"bit position $pos out of [0, $mBits)")
    buf(pos >>> 3) = (buf(pos >>> 3) | (1 << (pos & 7))).toByte
    buf
  }

  override def merge(a: Array[Byte], b: Array[Byte]): Array[Byte] = {
    var i = 0
    while (i < a.length) { a(i) = (a(i) | b(i)).toByte; i += 1 }
    a
  }

  override def finish(buf: Array[Byte]): Array[Byte] = buf

  override def bufferEncoder: Encoder[Array[Byte]] = Encoders.BINARY
  override def outputEncoder: Encoder[Array[Byte]] = Encoders.BINARY
}
