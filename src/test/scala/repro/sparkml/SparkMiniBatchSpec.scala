package repro.sparkml

import repro.SparkSpec
import repro.data.Datasets
import repro.linalg.MatrixCodec

/** Spark-side generation and per-partition encoding. */
class SparkMiniBatchSpec extends SparkSpec {

  test("generateDf produces exactly the same rows as the local generator") {
    val df = SparkMiniBatch.generateDf(spark, Datasets.census, 200, numPartitions = 4)
    import spark.implicits._
    val collected = df.as[(Long, Seq[Double], Double)].collect().sortBy(_._1)
    val (localX, localY) = Datasets.local(Datasets.census, 200)
    assert(collected.length == 200)
    collected.foreach { case (id, feats, lbl) =>
      assert(feats == localX.row(id.toInt).toSeq, s"row $id features")
      assert(lbl == localY(id.toInt), s"row $id label")
    }
  }

  for (method <- Seq("TOC", "DEN", "CSR")) {
    test(s"encodeBatches($method): batches decode back to the generated rows") {
      val df = SparkMiniBatch.generateDf(spark, Datasets.kdd99, 300, numPartitions = 2)
      val batches = SparkMiniBatch.encodeBatches(df, batchSize = 100, method).collect()
      assert(batches.map(_.n).sum == 300)
      // Every encoded row must decode to a generated dataset row (with its label).
      val ctx = new Datasets.GenContext(Datasets.kdd99)
      val expectRows = (0L until 300L).map { i =>
        val x = Datasets.row(ctx, i)
        (x.toSeq, Datasets.label(ctx, i, x))
      }.toSet
      batches.foreach { b =>
        val mb = SparkMiniBatch.decodeBatch(b)
        val dense = mb.x.decode
        for (i <- 0 until mb.size)
          assert(expectRows.contains((dense.row(i).toSeq, mb.y(i))), s"batch ${b.batch_id} row $i")
      }
    }
  }

  test("batch ids are unique and batches respect the batch size") {
    val df = SparkMiniBatch.generateDf(spark, Datasets.census, 500, numPartitions = 3)
    val batches = SparkMiniBatch.encodeBatches(df, batchSize = 64, "TOC").collect()
    assert(batches.map(_.batch_id).distinct.length == batches.length)
    assert(batches.forall(_.n <= 64))
  }

  test("encodedSizeBytes aggregates serialized x+y lengths via Spark SQL") {
    val df = SparkMiniBatch.generateDf(spark, Datasets.census, 200, numPartitions = 2)
    val ds = SparkMiniBatch.encodeBatches(df, 100, "TOC").cache()
    try {
      val viaSql = SparkMiniBatch.encodedSizeBytes(ds)
      val viaCollect = ds.collect().map(b => b.x.length.toLong + b.y.length).sum
      assert(viaSql == viaCollect)
      assert(viaSql > 0)
    } finally ds.unpersist()
  }

  test("TOC batches ship their physical bytes (compact vs DEN framing)") {
    val df = SparkMiniBatch.generateDf(spark, Datasets.census, 500, numPartitions = 1).cache()
    try {
      val toc = SparkMiniBatch.encodedSizeBytes(SparkMiniBatch.encodeBatches(df, 250, "TOC"))
      val den = SparkMiniBatch.encodedSizeBytes(SparkMiniBatch.encodeBatches(df, 250, "DEN"))
      assert(toc < den / 4, s"toc=$toc den=$den")
    } finally df.unpersist()
  }
}
