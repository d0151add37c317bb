package repro.bench

import repro.data.{DatasetSpec, Datasets}
import repro.linalg.{DenseMatrix, Encodings}

/** §5.2 harness (Figure 8 analog): runtimes of the four op classes on a
  * 250-row compressed mini-batch, per method per dataset. Supports the
  * Table 6/7 explanations (why TOC wins `A·M`/`M·A`, trails CSR on
  * `A·v`, and why Gzip/Snappy are orders slower).
  */
object MatrixOps {

  final case class Row(dataset: String, method: String, op: String, seconds: Double)

  val ops: Seq[String] = Seq("A.*c", "A.v", "v.A", "A.M", "M.A")

  def benchDataset(spec: DatasetSpec, batchRows: Int = 250, mCols: Int = 20,
                   methods: Seq[String] = Encodings.all.map(_.name),
                   reps: Int = 3): Seq[Row] = {
    val (x, _) = Datasets.slice(spec, 0, batchRows)
    val v = Array.tabulate(spec.cols)(j => math.sin(j + 1.0))
    val vLeft = Array.tabulate(batchRows)(i => math.cos(i + 1.0))
    val m = DenseMatrix.rand(spec.cols, mCols, seed = 7)
    val mLeft = DenseMatrix.rand(mCols, batchRows, seed = 8)

    methods.flatMap { name =>
      val a = Encodings.byName(name).encode(x)
      // TOC ops are measured from the physical bytes so each op pays the
      // §4.1.1 parse and the Algorithm 2 tree build, exactly the paper's
      // per-op accounting (the in-memory object memoizes C').
      val mk: () => repro.linalg.CompressedMatrix = a match {
        case toc: repro.core.TocMatrix =>
          val bytes = toc.toBytes
          () => repro.core.TocEncoder.fromBytes(bytes)
        case other => () => other
      }
      Seq(
        Row(spec.name, name, "A.*c", BenchUtil.bestOfSec(reps)(mk().timesScalar(1.0001))),
        Row(spec.name, name, "A.v", BenchUtil.bestOfSec(reps)(mk().timesVector(v))),
        Row(spec.name, name, "v.A", BenchUtil.bestOfSec(reps)(mk().vectorTimes(vLeft))),
        Row(spec.name, name, "A.M", BenchUtil.bestOfSec(reps)(mk().timesMatrix(m))),
        Row(spec.name, name, "M.A", BenchUtil.bestOfSec(reps)(mk().leftTimes(mLeft))))
    }
  }

  def render(rows: Seq[Row]): String = {
    val methods = rows.map(_.method).distinct
    val grouped = rows.groupBy(r => (r.dataset, r.op))
    val lines = for {
      ds <- rows.map(_.dataset).distinct
      op <- ops
    } yield {
      val per = grouped.getOrElse((ds, op), Nil).map(r => r.method -> r.seconds).toMap
      Seq(ds, op) ++ methods.map(m => per.get(m).map(BenchUtil.fmtSec).getOrElse("-"))
    }
    BenchUtil.renderTable(Seq("dataset", "op") ++ methods, lines)
  }
}
