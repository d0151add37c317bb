package repro.baselines

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import java.nio.{ByteBuffer, ByteOrder}
import java.util.zip.{GZIPInputStream, GZIPOutputStream}
import org.xerial.snappy.Snappy
import repro.linalg.{CompressedMatrix, DenseMatrix, MatrixEncoder}

/** The general compression schemes of §5 (methods #6 and #7): Gzip and
  * Snappy over the serialized DEN bytes. Per Figure 1B, *every* matrix
  * operation must first decompress the mini-batch — that decompression
  * overhead is exactly what the paper charges these methods with, so each
  * op here decodes and delegates to the dense kernels (and `A.*c`
  * re-compresses to stay in the compressed representation).
  */
abstract class GeneralCompressedMatrix(
    val numRows: Int,
    val numCols: Int,
    val compressed: Array[Byte]
) extends CompressedMatrix {

  protected def decompress(bytes: Array[Byte]): Array[Byte]
  protected def compress(bytes: Array[Byte]): Array[Byte]
  protected def rebuild(rows: Int, cols: Int, compressed: Array[Byte]): GeneralCompressedMatrix

  def sizeBytes: Long = 8L + compressed.length

  def decode: DenseMatrix = {
    val raw = decompress(compressed)
    val buf = ByteBuffer.wrap(raw).order(ByteOrder.LITTLE_ENDIAN)
    val data = new Array[Double](numRows * numCols)
    var i = 0
    while (i < data.length) { data(i) = buf.getDouble(); i += 1 }
    new DenseMatrix(numRows, numCols, data)
  }

  def timesVector(v: Array[Double]): Array[Double] = decode.timesVector(v)
  def vectorTimes(v: Array[Double]): Array[Double] = decode.vectorTimes(v)
  def timesMatrix(m: DenseMatrix): DenseMatrix = decode.timesMatrix(m)
  def leftTimes(m: DenseMatrix): DenseMatrix = decode.leftTimes(m)

  def timesScalar(c: Double): CompressedMatrix = {
    val scaled = decode.timesScalar(c)
    rebuild(numRows, numCols, compress(GeneralCompressedMatrix.serializeDen(scaled)))
  }
}

object GeneralCompressedMatrix {
  /** Row-major little-endian float64 serialization of DEN. */
  def serializeDen(m: DenseMatrix): Array[Byte] = {
    val buf = ByteBuffer.allocate(8 * m.data.length).order(ByteOrder.LITTLE_ENDIAN)
    m.data.foreach(buf.putDouble)
    buf.array()
  }
}

final class GzipMatrix(rows: Int, cols: Int, bytes: Array[Byte])
    extends GeneralCompressedMatrix(rows, cols, bytes) {
  protected def decompress(b: Array[Byte]): Array[Byte] = {
    val in = new GZIPInputStream(new ByteArrayInputStream(b))
    try in.readAllBytes() finally in.close()
  }
  protected def compress(b: Array[Byte]): Array[Byte] = GzipEncoder.gzip(b)
  protected def rebuild(r: Int, c: Int, b: Array[Byte]): GzipMatrix = new GzipMatrix(r, c, b)
}

object GzipEncoder extends MatrixEncoder {
  val name = "Gzip"
  private[baselines] def gzip(bytes: Array[Byte]): Array[Byte] = {
    val bos = new ByteArrayOutputStream()
    val out = new GZIPOutputStream(bos)
    out.write(bytes); out.close()
    bos.toByteArray
  }
  def encode(batch: DenseMatrix): GzipMatrix =
    new GzipMatrix(batch.rows, batch.cols, gzip(GeneralCompressedMatrix.serializeDen(batch)))
}

final class SnappyMatrix(rows: Int, cols: Int, bytes: Array[Byte])
    extends GeneralCompressedMatrix(rows, cols, bytes) {
  protected def decompress(b: Array[Byte]): Array[Byte] = Snappy.uncompress(b)
  protected def compress(b: Array[Byte]): Array[Byte] = Snappy.compress(b)
  protected def rebuild(r: Int, c: Int, b: Array[Byte]): SnappyMatrix = new SnappyMatrix(r, c, b)
}

object SnappyEncoder extends MatrixEncoder {
  val name = "Snappy"
  def encode(batch: DenseMatrix): SnappyMatrix =
    new SnappyMatrix(batch.rows, batch.cols,
      Snappy.compress(GeneralCompressedMatrix.serializeDen(batch)))
}
