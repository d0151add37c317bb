package repro.core

import repro.linalg.DenseMatrix

/** A column_index:value pair — the compression unit of TOC (§3).
  *
  * Also the sparse representation of a length-`numCols` vector with a
  * single non-zero, which is how Theorems 1–4 treat `C'[i].key`.
  */
final case class ColValue(col: Int, value: Double)

/** §3 sparse encoding: drop zeros, prefix each remaining value with its
  * column index. `A` (dense table) becomes `B` (per-row pair sequences).
  */
object SparseEncoder {
  /** Encode one dense row. */
  def encodeRow(row: Array[Double]): Array[ColValue] = {
    val out = Array.newBuilder[ColValue]
    var j = 0
    while (j < row.length) {
      if (row(j) != 0.0) out += ColValue(j, row(j))
      j += 1
    }
    out.result()
  }

  /** Encode the full table `A` → `B`. */
  def encode(a: DenseMatrix): Array[Array[ColValue]] =
    Array.tabulate(a.rows)(i => encodeRow(a.row(i)))

  /** Decode `B` back to `A` given the column count. */
  def decode(b: Array[Array[ColValue]], cols: Int): DenseMatrix = {
    val m = DenseMatrix.zeros(b.length, cols)
    var i = 0
    while (i < b.length) {
      b(i).foreach(cv => m(i, cv.col) = cv.value)
      i += 1
    }
    m
  }
}
