package repro.bench

import repro.core.TocEncoder
import repro.data.{DatasetSpec, Datasets}
import repro.linalg.{DenseMatrix, Encodings}

/** §5.1 harness: compression ratios of every method on mini-batches of
  * the paper's sizes (Figure 5) plus the TOC ablation variants
  * (Figure 6). Ratio = DEN bytes / method bytes, averaged over sampled
  * batches. Backs the Table 6/7 memory-fit decisions.
  */
object CompressionRatios {

  final case class Row(dataset: String, method: String, batchRows: Int, ratio: Double)

  val paperBatchSizes: Seq[Int] = Seq(50, 100, 150, 200, 250)

  /** Mean compression ratio of `method` over `numBatches` sampled batches. */
  def ratioFor(spec: DatasetSpec, batchRows: Int, method: String, numBatches: Int = 4): Double = {
    val enc = Encodings.byName(method)
    val ratios = (0 until numBatches).map { b =>
      val (x, _) = Datasets.slice(spec, b.toLong * batchRows, batchRows)
      x.denSizeBytes.toDouble / enc.encode(x).sizeBytes
    }
    ratios.sum / ratios.size
  }

  /** TOC ablation (Figure 6): sparse-only / sparse+logical / full sizes. */
  final case class Ablation(sparse: Double, sparseLogical: Double, full: Double)

  def ablationFor(spec: DatasetSpec, batchRows: Int): Ablation = {
    val (x, _) = Datasets.slice(spec, 0, batchRows)
    val den = x.denSizeBytes.toDouble
    Ablation(
      sparse = den / TocEncoder.sparseOnlySizeBytes(x),
      sparseLogical = den / TocEncoder.sparseLogicalSizeBytes(x),
      full = den / TocEncoder.encode(x).sizeBytes)
  }

  /** Full sweep for one dataset at one batch size. */
  def sweep(spec: DatasetSpec, batchRows: Int): Seq[Row] =
    Encodings.all.map(e => Row(spec.name, e.name, batchRows, ratioFor(spec, batchRows, e.name)))

  def render(rows: Seq[Row]): String =
    BenchUtil.renderTable(
      Seq("dataset", "batch", "method", "ratio (x)"),
      rows.map(r => Seq(r.dataset, r.batchRows.toString, r.method, f"${r.ratio}%.2f")))
}
