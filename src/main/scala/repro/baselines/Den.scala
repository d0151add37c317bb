package repro.baselines

import repro.linalg.{CompressedMatrix, DenseMatrix, MatrixEncoder}

/** DEN (§5 "Compared Methods" #1): the uncompressed dense baseline —
  * row-major IEEE-754 doubles. All ops are the plain dense loops.
  */
final class DenMatrix(val m: DenseMatrix) extends CompressedMatrix {
  def numRows: Int = m.rows
  def numCols: Int = m.cols
  def sizeBytes: Long = m.denSizeBytes
  def timesVector(v: Array[Double]): Array[Double] = m.timesVector(v)
  def vectorTimes(v: Array[Double]): Array[Double] = m.vectorTimes(v)
  def timesMatrix(o: DenseMatrix): DenseMatrix = m.timesMatrix(o)
  def leftTimes(o: DenseMatrix): DenseMatrix = m.leftTimes(o)
  def timesScalar(c: Double): DenMatrix = new DenMatrix(m.timesScalar(c))
  def decode: DenseMatrix = m
}

object DenEncoder extends MatrixEncoder {
  val name = "DEN"
  def encode(batch: DenseMatrix): DenMatrix = new DenMatrix(batch)
}
