package repro.baselines

import repro.core.BitPacking
import repro.linalg.{CompressedMatrix, DenseMatrix, MatrixEncoder}
import scala.collection.mutable

/** CVI / CSR-VI (§5 "Compared Methods" #3, [Kourtis et al.]): CSR whose
  * non-zero values are dictionary-coded (value indexing, §3.2) with
  * bit-packed value indexes. Ops resolve values through the dictionary.
  */
final class CviMatrix(
    val numRows: Int,
    val numCols: Int,
    val dict: Array[Double],
    val valIdx: Array[Int],  // per-nonzero dictionary index
    val colIdx: Array[Int],
    val rowPtr: Array[Int]
) extends CompressedMatrix {

  def sizeBytes: Long =
    8L + 8L * dict.length + BitPacking.packedSize(valIdx) +
      4L * colIdx.length + 4L * rowPtr.length

  @inline private def value(k: Int): Double = dict(valIdx(k))

  def timesVector(v: Array[Double]): Array[Double] = {
    require(v.length == numCols)
    val out = new Array[Double](numRows)
    var i = 0
    while (i < numRows) {
      var s = 0.0
      var k = rowPtr(i)
      while (k < rowPtr(i + 1)) { s += value(k) * v(colIdx(k)); k += 1 }
      out(i) = s
      i += 1
    }
    out
  }

  def vectorTimes(v: Array[Double]): Array[Double] = {
    require(v.length == numRows)
    val out = new Array[Double](numCols)
    var i = 0
    while (i < numRows) {
      val vi = v(i)
      if (vi != 0.0) {
        var k = rowPtr(i)
        while (k < rowPtr(i + 1)) { out(colIdx(k)) += vi * value(k); k += 1 }
      }
      i += 1
    }
    out
  }

  def timesMatrix(m: DenseMatrix): DenseMatrix = {
    require(m.rows == numCols)
    val p = m.cols
    val out = new Array[Double](numRows * p)
    var i = 0
    while (i < numRows) {
      var k = rowPtr(i)
      while (k < rowPtr(i + 1)) {
        val a = value(k); val mBase = colIdx(k) * p; val oBase = i * p
        var j = 0
        while (j < p) { out(oBase + j) += a * m.data(mBase + j); j += 1 }
        k += 1
      }
      i += 1
    }
    new DenseMatrix(numRows, p, out)
  }

  def leftTimes(m: DenseMatrix): DenseMatrix = {
    require(m.cols == numRows)
    val p = m.rows
    val out = new Array[Double](p * numCols)
    var i = 0
    while (i < numRows) {
      var k = rowPtr(i)
      while (k < rowPtr(i + 1)) {
        val a = value(k); val c = colIdx(k)
        var r = 0
        while (r < p) { out(r * numCols + c) += m.data(r * numRows + i) * a; r += 1 }
        k += 1
      }
      i += 1
    }
    new DenseMatrix(p, numCols, out)
  }

  /** Sparse-safe scalar multiply: scale the dictionary only (why value
    * indexing makes `A.*c` fast — §5.2).
    */
  def timesScalar(c: Double): CviMatrix =
    new CviMatrix(numRows, numCols, dict.map(_ * c), valIdx, colIdx, rowPtr)

  def decode: DenseMatrix = {
    val out = DenseMatrix.zeros(numRows, numCols)
    var i = 0
    while (i < numRows) {
      var k = rowPtr(i)
      while (k < rowPtr(i + 1)) { out(i, colIdx(k)) = value(k); k += 1 }
      i += 1
    }
    out
  }
}

object CviEncoder extends MatrixEncoder {
  val name = "CVI"
  def encode(batch: DenseMatrix): CviMatrix = {
    val csr = CsrEncoder.encode(batch)
    val dictIndex = mutable.LinkedHashMap.empty[Double, Int]
    val valIdx = csr.values.map(v => dictIndex.getOrElseUpdate(v, dictIndex.size))
    new CviMatrix(csr.numRows, csr.numCols, dictIndex.keys.toArray, valIdx, csr.colIdx, csr.rowPtr)
  }
}
