package repro.bench

import repro.data.{DatasetSpec, Datasets}
import repro.linalg.Encodings

/** §5.4 harness (Figure 12 analog): compression and decompression times
  * of Snappy, Gzip and TOC on a 250-row mini-batch. The paper's shape:
  * TOC compresses slower than Snappy but faster than Gzip, and
  * decompresses faster than both.
  */
object CompressSpeed {

  final case class Row(dataset: String, method: String, compressSec: Double, decompressSec: Double)

  val methods: Seq[String] = Seq("Snappy", "Gzip", "TOC")

  def benchDataset(spec: DatasetSpec, batchRows: Int = 250, reps: Int = 10): Seq[Row] = {
    val (x, _) = Datasets.slice(spec, 0, batchRows)
    methods.map { name =>
      val enc = Encodings.byName(name)
      val compressed = enc.encode(x)
      // TOC decompression is measured from bytes (parse + tree build +
      // backtrack), mirroring how Gzip/Snappy pay inflation every time.
      val mk: () => repro.linalg.CompressedMatrix = compressed match {
        case toc: repro.core.TocMatrix =>
          val bytes = toc.toBytes
          () => repro.core.TocEncoder.fromBytes(bytes)
        case other => () => other
      }
      Row(spec.name, name,
        compressSec = BenchUtil.bestOfSec(reps)(enc.encode(x)),
        decompressSec = BenchUtil.bestOfSec(reps)(mk().decode))
    }
  }

  def render(rows: Seq[Row]): String =
    BenchUtil.renderTable(
      Seq("dataset", "method", "compress", "decompress"),
      rows.map(r => Seq(r.dataset, r.method, BenchUtil.fmtSec(r.compressSec), BenchUtil.fmtSec(r.decompressSec))))
}
