package repro.sparkml

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.{DatasetSpec, Datasets}
import repro.linalg.{DenseMatrix, Encodings, MatrixCodec}
import repro.mgd.MiniBatch

/** One encoded mini-batch as carried through a Spark DataFrame: `x` is
  * the serialized compressed matrix (TOC's real physical bytes, or the
  * tagged framing for the other schemes), `y` the packed label vector.
  */
final case class EncodedBatchRow(batch_id: Long, n: Int, x: Array[Byte], y: Array[Byte])

/** The Spark-side substrate (DESIGN.md §3): mini-batches are assembled
  * and compressed by per-partition functions running inside executors —
  * the reproduction analog of the paper's Bismarck integration (App. D.1,
  * where compressed batches live as variable-length bytes fields in a
  * database table).
  */
object SparkMiniBatch {

  /** Generate a dataset analog as a DataFrame `(id, features, label)`.
    * Row content is the same pure function of (spec, id) the local path
    * uses, evaluated inside executors.
    */
  def generateDf(spark: SparkSession, spec: DatasetSpec, numRows: Long,
                 numPartitions: Int = 0): DataFrame = {
    import spark.implicits._
    val base =
      if (numPartitions > 0) spark.range(0, numRows, 1, numPartitions)
      else spark.range(numRows)
    base.mapPartitions { it =>
      val ctx = new Datasets.GenContext(spec)
      it.map { idRow =>
        val i = idRow
        val x = Datasets.row(ctx, i)
        (i, x, Datasets.label(ctx, i, x))
      }
    }.toDF("id", "features", "label")
  }

  /** Group each partition's rows into consecutive mini-batches of
    * `batchSize` and compress them with `encoderName` — the per-partition
    * UDF pattern: encoding happens next to the data, inside executors.
    */
  def encodeBatches(df: DataFrame, batchSize: Int, encoderName: String): Dataset[EncodedBatchRow] = {
    val spark = df.sparkSession
    import spark.implicits._
    df.select(col("id").cast("long"), col("features"), col("label").cast("double"))
      .as[(Long, Seq[Double], Double)]
      .mapPartitions { it =>
        val encoder = Encodings.byName(encoderName)
        val pid = org.apache.spark.TaskContext.getPartitionId()
        it.grouped(batchSize).zipWithIndex.map { case (rows, bi) =>
          val n = rows.size
          val cols = rows.head._2.size
          val data = new Array[Double](n * cols)
          val y = new Array[Double](n)
          var i = 0
          rows.foreach { case (_, feats, lbl) =>
            var j = 0
            feats.foreach { v => data(i * cols + j) = v; j += 1 }
            y(i) = lbl
            i += 1
          }
          val enc = encoder.encode(new DenseMatrix(n, cols, data))
          EncodedBatchRow(pid.toLong * 1000000L + bi, n, MatrixCodec.serialize(enc), MatrixCodec.serializeVector(y))
        }
      }
  }

  /** Decode a DataFrame row back to a [[MiniBatch]] (executor side). */
  def decodeBatch(row: EncodedBatchRow): MiniBatch =
    MiniBatch(MatrixCodec.deserialize(row.x), MatrixCodec.deserializeVector(row.y))

  /** Total serialized size of all encoded batches, via a SQL aggregate. */
  def encodedSizeBytes(batches: Dataset[EncodedBatchRow]): Long = {
    val spark = batches.sparkSession
    import spark.implicits._
    batches.select(sum(length(col("x")) + length(col("y"))).cast("long")).as[Long].head()
  }
}
