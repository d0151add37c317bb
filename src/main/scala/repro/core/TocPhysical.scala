package repro.core

import java.nio.{ByteBuffer, ByteOrder}
import scala.collection.mutable

/** §3.2 physical encoding: the on-disk / in-memory byte layout of a TOC
  * compressed mini-batch.
  *
  * `I` is split into a bit-packed column-index array and a value-indexed
  * (dictionary-coded) value array whose indexes are bit-packed; `D` is
  * the concatenation of all tuples' codes, bit-packed, plus bit-packed
  * tuple starting offsets.
  *
  * Layout (little-endian):
  * {{{
  * int32 numRows | int32 numCols | int32 dictLen | dictLen * float64
  * | pack(I.cols) | pack(I.valueIdx) | pack(D.tokens) | pack(rowStarts)
  * }}}
  */
final case class TocPhysical(
    numRows: Int,
    numCols: Int,
    dict: Array[Double],      // distinct values, first-occurrence order
    iCols: Array[Int],        // column index of I[k]
    iValIdx: Array[Int],      // dictionary index of I[k]'s value
    tokens: Array[Int],       // D flattened row-by-row
    rowStarts: Array[Int]     // starting offset of each tuple in `tokens`
) {
  require(iCols.length == iValIdx.length)
  require(rowStarts.length == numRows)

  /** Exact size of the serialized form in bytes — the quantity used for
    * compression ratios (Figure 5 / §5.1).
    */
  def sizeBytes: Long =
    4L + 4L + 4L + 8L * dict.length +
      BitPacking.packedSize(iCols) + BitPacking.packedSize(iValIdx) +
      BitPacking.packedSize(tokens) + BitPacking.packedSize(rowStarts)

  /** Serialize to the physical byte layout. */
  def toBytes: Array[Byte] = {
    val buf = ByteBuffer.allocate(sizeBytes.toInt).order(ByteOrder.LITTLE_ENDIAN)
    buf.putInt(numRows); buf.putInt(numCols)
    buf.putInt(dict.length)
    dict.foreach(buf.putDouble)
    BitPacking.packInto(iCols, buf)
    BitPacking.packInto(iValIdx, buf)
    BitPacking.packInto(tokens, buf)
    BitPacking.packInto(rowStarts, buf)
    buf.array()
  }

  /** Reconstruct the logical `I` (pairs of the first tree layer). */
  def iPairs: Array[ColValue] =
    Array.tabulate(iCols.length)(k => ColValue(iCols(k), dict(iValIdx(k))))

  /** Reconstruct the logical `D` (per-tuple code vectors). */
  def dRows: Array[Array[Int]] =
    Array.tabulate(numRows) { r =>
      val from = rowStarts(r)
      val to   = if (r + 1 < numRows) rowStarts(r + 1) else tokens.length
      java.util.Arrays.copyOfRange(tokens, from, to)
    }
}

object TocPhysical {

  /** Physically encode logical outputs (`I`, `D`). */
  def encode(numRows: Int, numCols: Int, enc: LogicalEncoded): TocPhysical = {
    // Value indexing: dictionary of distinct values in first-occurrence order.
    val dictIndex = mutable.LinkedHashMap.empty[Double, Int]
    val iValIdx = enc.i.map { cv =>
      dictIndex.getOrElseUpdate(cv.value, dictIndex.size)
    }
    val dict = dictIndex.keys.toArray
    val iCols = enc.i.map(_.col)

    val tokens = enc.d.flatten
    val rowStarts = new Array[Int](numRows)
    var off = 0
    var r = 0
    while (r < numRows) {
      rowStarts(r) = off
      off += enc.d(r).length
      r += 1
    }
    TocPhysical(numRows, numCols, dict, iCols, iValIdx, tokens, rowStarts)
  }

  /** Deserialize from the physical byte layout. */
  def fromBytes(bytes: Array[Byte]): TocPhysical = {
    val buf = ByteBuffer.wrap(bytes).order(ByteOrder.LITTLE_ENDIAN)
    val numRows = buf.getInt(); val numCols = buf.getInt()
    val dict = Array.fill(buf.getInt())(buf.getDouble())
    val iCols = BitPacking.unpackFrom(buf)
    val iValIdx = BitPacking.unpackFrom(buf)
    val tokens = BitPacking.unpackFrom(buf)
    val rowStarts = BitPacking.unpackFrom(buf)
    TocPhysical(numRows, numCols, dict, iCols, iValIdx, tokens, rowStarts)
  }
}
