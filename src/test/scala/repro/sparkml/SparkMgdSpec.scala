package repro.sparkml

import repro.SparkSpec
import repro.data.Datasets
import repro.linalg.Encodings
import repro.mgd._

/** Distributed MGD: per-partition sequential training + model averaging. */
class SparkMgdSpec extends SparkSpec {

  def encodedBatches(rows: Int, partitions: Int, method: String = "TOC") = {
    val df = SparkMiniBatch.generateDf(spark, Datasets.census, rows, partitions)
    SparkMiniBatch.encodeBatches(df, batchSize = 100, method)
  }

  test("single partition: Spark training equals local sequential MGD exactly") {
    val rows = 400
    val sparkRes = SparkMgd.train(encodedBatches(rows, 1), new LogisticRegression(68), 0.1, 2)
    val (x, y) = Datasets.local(Datasets.census, rows)
    val localBatches = Mgd.makeBatches(x, y, 100, Encodings.byName("TOC"))
    val localRes = Mgd.train(localBatches, new LogisticRegression(68), 0.1, 2)
    sparkRes.model.params.zip(localRes.model.params).foreach { case (s, l) =>
      assert(math.abs(s - l) < 1e-10, "single-partition Spark must equal sequential MGD")
    }
  }

  test("multi-partition LR training decreases loss per epoch") {
    val batches = encodedBatches(1200, 4).cache()
    try {
      val res = SparkMgd.train(batches, new LogisticRegression(68), 0.1, 3, trackLoss = true)
      assert(res.lossPerEpoch.length == 3)
      assert(res.lossPerEpoch.head > res.lossPerEpoch.last)
    } finally batches.unpersist()
  }

  test("multi-partition SVM training decreases loss") {
    val batches = encodedBatches(1200, 4).cache()
    try {
      val model = new Svm(68)
      val before = SparkMgd.meanLoss(batches, model)
      val res = SparkMgd.train(batches, model, 0.05, 2)
      assert(SparkMgd.meanLoss(batches, res.model) < before)
    } finally batches.unpersist()
  }

  test("multi-partition NN training decreases loss (model averaging)") {
    val batches = encodedBatches(800, 4).cache()
    try {
      val model = new NeuralNet(68, 16, 8, 2)
      val before = SparkMgd.meanLoss(batches, model)
      val res = SparkMgd.train(batches, model, 0.3, 2)
      assert(SparkMgd.meanLoss(batches, res.model) < before)
    } finally batches.unpersist()
  }

  test("averaging weights partitions by row count") {
    // Two partitions of different sizes: the averaged parameters must lie
    // between the per-partition results, closer to the bigger partition.
    val batches = encodedBatches(600, 3).cache()
    try {
      val model = new LogisticRegression(68)
      val out = SparkMgd.trainEpoch(batches, model, 0.1)
      assert(out.params.exists(_ != 0.0))
      assert(!(out.params sameElements model.params))
    } finally batches.unpersist()
  }

  test("meanLoss agrees with local mean loss on the same data") {
    val batches = encodedBatches(400, 1)
    val model = new LogisticRegression(68)
    val sparkLoss = SparkMgd.meanLoss(batches, model)
    val (x, y) = Datasets.local(Datasets.census, 400)
    val localLoss = Mgd.meanLoss(Mgd.makeBatches(x, y, 100, Encodings.byName("TOC")), model)
    assert(math.abs(sparkLoss - localLoss) < 1e-10)
  }

  test("TOC and DEN Spark training produce the same averaged model") {
    val toc = SparkMgd.train(encodedBatches(600, 2, "TOC"), new LogisticRegression(68), 0.1, 2)
    val den = SparkMgd.train(encodedBatches(600, 2, "DEN"), new LogisticRegression(68), 0.1, 2)
    toc.model.params.zip(den.model.params).foreach { case (t, d) =>
      assert(math.abs(t - d) < 1e-8)
    }
  }
}
