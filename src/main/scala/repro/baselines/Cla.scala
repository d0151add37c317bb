package repro.baselines

import repro.core.BitPacking
import repro.linalg.{CompressedMatrix, DenseMatrix, MatrixEncoder}
import scala.collection.mutable

/** CLA (§5 "Compared Methods" #5, [Elgohary et al., VLDB'16]) — our
  * reimplementation of compressed linear algebra's column-group scheme.
  *
  * Each column becomes either a DDC group (explicit value dictionary +
  * bit-packed per-row code — SystemML's dense dictionary coding) when its
  * distinct-value count is small enough to pay off, or an uncompressed
  * (UC) column of raw doubles. This captures the two properties the paper
  * leans on when comparing against CLA on mini-batches: direct compressed
  * execution, and an explicit per-batch dictionary whose cost is poorly
  * amortized on small batches (§7 "Compressed Linear Algebra").
  *
  * Substitution note (DESIGN.md §4): SystemML additionally co-codes
  * correlated columns and has OLE/RLE group types; single-column DDC+UC
  * preserves the size and runtime *shape* on mini-batches without the
  * planner machinery.
  */
sealed trait ClaGroup extends Serializable {
  def col: Int
  def sizeBytes: Long
  def valueAt(row: Int): Double
  def scaled(c: Double): ClaGroup
}

/** Dense dictionary-coded column. */
final case class DdcGroup(col: Int, dict: Array[Double], codes: Array[Int]) extends ClaGroup {
  def sizeBytes: Long = 4L + 8L * dict.length + BitPacking.packedSize(codes)
  @inline def valueAt(row: Int): Double = dict(codes(row))
  def scaled(c: Double): DdcGroup = DdcGroup(col, dict.map(_ * c), codes)
}

/** Uncompressed column fallback. */
final case class UcGroup(col: Int, values: Array[Double]) extends ClaGroup {
  def sizeBytes: Long = 4L + 8L * values.length
  @inline def valueAt(row: Int): Double = values(row)
  def scaled(c: Double): UcGroup = UcGroup(col, values.map(_ * c))
}

final class ClaMatrix(val numRows: Int, val numCols: Int, val groups: Array[ClaGroup])
    extends CompressedMatrix {

  def sizeBytes: Long = 8L + groups.map(_.sizeBytes).sum

  def timesVector(v: Array[Double]): Array[Double] = {
    require(v.length == numCols)
    val out = new Array[Double](numRows)
    groups.foreach {
      case DdcGroup(col, dict, codes) =>
        // CLA's pre-aggregation: scale the dictionary once, then scan codes.
        val scaled = dict.map(_ * v(col))
        var i = 0
        while (i < numRows) { out(i) += scaled(codes(i)); i += 1 }
      case UcGroup(col, values) =>
        val vj = v(col)
        if (vj != 0.0) {
          var i = 0
          while (i < numRows) { out(i) += values(i) * vj; i += 1 }
        }
    }
    out
  }

  def vectorTimes(v: Array[Double]): Array[Double] = {
    require(v.length == numRows)
    val out = new Array[Double](numCols)
    groups.foreach {
      case DdcGroup(col, dict, codes) =>
        // Aggregate v per code, then one pass over the dictionary.
        val agg = new Array[Double](dict.length)
        var i = 0
        while (i < numRows) { agg(codes(i)) += v(i); i += 1 }
        var d = 0
        var s = 0.0
        while (d < dict.length) { s += dict(d) * agg(d); d += 1 }
        out(col) = s
      case UcGroup(col, values) =>
        var s = 0.0
        var i = 0
        while (i < numRows) { s += values(i) * v(i); i += 1 }
        out(col) = s
    }
    out
  }

  /** `A·M` as p independent `A·v` passes (SystemML's CLA at the paper's
    * version did not support `A·M` — §5.2 excludes it; we provide it so
    * the NN workload still runs, noting the exclusion in the bench).
    */
  def timesMatrix(m: DenseMatrix): DenseMatrix = {
    require(m.rows == numCols)
    val p = m.cols
    val out = new Array[Double](numRows * p)
    var j = 0
    while (j < p) {
      val col = m.col(j)
      val r = timesVector(col)
      var i = 0
      while (i < numRows) { out(i * p + j) = r(i); i += 1 }
      j += 1
    }
    new DenseMatrix(numRows, p, out)
  }

  def leftTimes(m: DenseMatrix): DenseMatrix = {
    require(m.cols == numRows)
    val p = m.rows
    val out = new Array[Double](p * numCols)
    var r = 0
    while (r < p) {
      val row = Array.tabulate(numRows)(i => m.data(r * numRows + i))
      val res = vectorTimes(row)
      System.arraycopy(res, 0, out, r * numCols, numCols)
      r += 1
    }
    new DenseMatrix(p, numCols, out)
  }

  def timesScalar(c: Double): ClaMatrix =
    new ClaMatrix(numRows, numCols, groups.map(_.scaled(c)))

  def decode: DenseMatrix = {
    val out = DenseMatrix.zeros(numRows, numCols)
    groups.foreach { g =>
      var i = 0
      while (i < numRows) { out(i, g.col) = g.valueAt(i); i += 1 }
    }
    out
  }
}

object ClaEncoder extends MatrixEncoder {
  val name = "CLA"

  def encode(batch: DenseMatrix): ClaMatrix = {
    val groups = Array.tabulate[ClaGroup](batch.cols) { j =>
      val colVals = batch.col(j)
      val dictIndex = mutable.LinkedHashMap.empty[Double, Int]
      var i = 0
      var abort = false
      // DDC pays off only while the dictionary stays small relative to rows.
      while (i < colVals.length && !abort) {
        dictIndex.getOrElseUpdate(colVals(i), dictIndex.size)
        if (dictIndex.size > math.max(1, colVals.length / 2)) abort = true
        i += 1
      }
      if (abort) UcGroup(j, colVals)
      else {
        val codes = colVals.map(dictIndex(_))
        val ddc = DdcGroup(j, dictIndex.keys.toArray, codes)
        if (ddc.sizeBytes < UcGroup(j, colVals).sizeBytes) ddc else UcGroup(j, colVals)
      }
    }
    new ClaMatrix(batch.rows, batch.cols, groups)
  }
}
