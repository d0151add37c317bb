package repro.jobs

import repro.bench.BenchUtil
import repro.core.TocEncoder
import repro.data.Datasets
import repro.linalg.DenseMatrix

/** Kernel-cost probe: TOC structure statistics (|I|, |D|, tree size vs
  * nnz) and per-op times per dataset analog, used to calibrate the
  * mutation/variant knobs so Table 6's op-cost shape matches the paper.
  */
object OpProbeJob {
  def main(args: Array[String]): Unit = {
    for (base <- Seq(Datasets.mnist, Datasets.imagenet, Datasets.census, Datasets.kdd99)) {
      val (x, _) = Datasets.slice(base, 0, 250)
      val toc = TocEncoder.encode(x)
      val p = toc.physical
      val nnz = (x.sparsity * x.rows * x.cols).toInt
      val treeSize = 1 + p.iCols.length + p.tokens.length - p.numRows
      println(f"${base.name}%-15s nnz=$nnz%7d  |I|=${p.iCols.length}%6d  |D|=${p.tokens.length}%6d " +
        f"tree=$treeSize%6d  ratio=${x.denSizeBytes.toDouble / toc.sizeBytes}%6.2f")
      val v = Array.fill(x.cols)(1.0)
      val u = Array.fill(x.rows)(1.0)
      val m = DenseMatrix.rand(x.cols, 200, 1)
      val ml = DenseMatrix.rand(200, x.rows, 2)
      val den = repro.baselines.DenEncoder.encode(x)
      val csr = repro.baselines.CsrEncoder.encode(x)
      def t(f: => Unit): String = BenchUtil.fmtSec(BenchUtil.bestOfSec(3)(f))
      println(s"  A.v  toc=${t(toc.timesVector(v))} csr=${t(csr.timesVector(v))} den=${t(den.timesVector(v))}")
      println(s"  v.A  toc=${t(toc.vectorTimes(u))} csr=${t(csr.vectorTimes(u))} den=${t(den.vectorTimes(u))}")
      println(s"  A.M200 toc=${t(toc.timesMatrix(m))} csr=${t(csr.timesMatrix(m))} den=${t(den.timesMatrix(m))}")
      println(s"  M200.A toc=${t(toc.leftTimes(ml))} csr=${t(csr.leftTimes(ml))} den=${t(den.leftTimes(ml))}")
    }
  }
}
