package repro.baselines

import repro.linalg.{CompressedMatrix, DenseMatrix, MatrixEncoder}

/** CSR (§5 "Compared Methods" #2): compressed sparse row — per row only
  * the non-zero values (float64) and their column indexes (int32).
  */
final class CsrMatrix(
    val numRows: Int,
    val numCols: Int,
    val values: Array[Double],
    val colIdx: Array[Int],
    val rowPtr: Array[Int] // length numRows + 1
) extends CompressedMatrix {

  def sizeBytes: Long = 8L + 8L * values.length + 4L * colIdx.length + 4L * rowPtr.length

  def timesVector(v: Array[Double]): Array[Double] = {
    require(v.length == numCols)
    val out = new Array[Double](numRows)
    var i = 0
    while (i < numRows) {
      var s = 0.0
      var k = rowPtr(i)
      while (k < rowPtr(i + 1)) { s += values(k) * v(colIdx(k)); k += 1 }
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
        while (k < rowPtr(i + 1)) { out(colIdx(k)) += vi * values(k); k += 1 }
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
        val a = values(k); val mBase = colIdx(k) * p; val oBase = i * p
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
        val a = values(k); val c = colIdx(k)
        var r = 0
        while (r < p) { out(r * numCols + c) += m.data(r * numRows + i) * a; r += 1 }
        k += 1
      }
      i += 1
    }
    new DenseMatrix(p, numCols, out)
  }

  def timesScalar(c: Double): CsrMatrix =
    new CsrMatrix(numRows, numCols, values.map(_ * c), colIdx, rowPtr)

  def decode: DenseMatrix = {
    val out = DenseMatrix.zeros(numRows, numCols)
    var i = 0
    while (i < numRows) {
      var k = rowPtr(i)
      while (k < rowPtr(i + 1)) { out(i, colIdx(k)) = values(k); k += 1 }
      i += 1
    }
    out
  }
}

object CsrEncoder extends MatrixEncoder {
  val name = "CSR"
  def encode(batch: DenseMatrix): CsrMatrix = {
    val values = Array.newBuilder[Double]
    val colIdx = Array.newBuilder[Int]
    val rowPtr = new Array[Int](batch.rows + 1)
    var nnz = 0
    var i = 0
    while (i < batch.rows) {
      rowPtr(i) = nnz
      var j = 0
      while (j < batch.cols) {
        val x = batch(i, j)
        if (x != 0.0) { values += x; colIdx += j; nnz += 1 }
        j += 1
      }
      i += 1
    }
    rowPtr(batch.rows) = nnz
    new CsrMatrix(batch.rows, batch.cols, values.result(), colIdx.result(), rowPtr)
  }
}
