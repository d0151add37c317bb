package repro.baselines

import repro.core.BitPacking
import repro.linalg.{CompressedMatrix, DenseMatrix, MatrixEncoder}
import scala.collection.mutable

/** DVI (§5 "Compared Methods" #4): the dense layout with value indexing —
  * every cell (zeros included) is a bit-packed dictionary index.
  */
final class DviMatrix(
    val numRows: Int,
    val numCols: Int,
    val dict: Array[Double],
    val cells: Array[Int]  // row-major dictionary index per cell
) extends CompressedMatrix {

  def sizeBytes: Long = 8L + 8L * dict.length + BitPacking.packedSize(cells)

  @inline private def value(i: Int, j: Int): Double = dict(cells(i * numCols + j))

  def timesVector(v: Array[Double]): Array[Double] = {
    require(v.length == numCols)
    val out = new Array[Double](numRows)
    var i = 0
    while (i < numRows) {
      var s = 0.0; var j = 0; val base = i * numCols
      while (j < numCols) { s += dict(cells(base + j)) * v(j); j += 1 }
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
        var j = 0; val base = i * numCols
        while (j < numCols) { out(j) += vi * dict(cells(base + j)); j += 1 }
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
      var k = 0
      while (k < numCols) {
        val a = value(i, k)
        if (a != 0.0) {
          val mBase = k * p; val oBase = i * p
          var j = 0
          while (j < p) { out(oBase + j) += a * m.data(mBase + j); j += 1 }
        }
        k += 1
      }
      i += 1
    }
    new DenseMatrix(numRows, p, out)
  }

  def leftTimes(m: DenseMatrix): DenseMatrix = {
    require(m.cols == numRows)
    m.timesMatrix(decode)
  }

  /** Sparse-safe scalar multiply: scale the dictionary only. */
  def timesScalar(c: Double): DviMatrix =
    new DviMatrix(numRows, numCols, dict.map(_ * c), cells)

  def decode: DenseMatrix = {
    val out = new Array[Double](numRows * numCols)
    var k = 0
    while (k < out.length) { out(k) = dict(cells(k)); k += 1 }
    new DenseMatrix(numRows, numCols, out)
  }
}

object DviEncoder extends MatrixEncoder {
  val name = "DVI"
  def encode(batch: DenseMatrix): DviMatrix = {
    val dictIndex = mutable.LinkedHashMap.empty[Double, Int]
    val cells = batch.data.map(v => dictIndex.getOrElseUpdate(v, dictIndex.size))
    new DviMatrix(batch.rows, batch.cols, dictIndex.keys.toArray, cells)
  }
}
