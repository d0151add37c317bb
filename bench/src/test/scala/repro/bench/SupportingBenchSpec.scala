package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets

/** The figure-backed supporting measurements behind Tables 6/7: §5.1
  * compression ratios (Fig. 5/6), §5.2 matrix-op runtimes (Fig. 8), §5.4
  * compression/decompression speed (Fig. 12). Shape assertions mirror the
  * paper's prose claims.
  */
class SupportingBenchSpec extends AnyFunSuite {

  lazy val ratioRows: Seq[CompressionRatios.Row] =
    Datasets.all.flatMap(s => CompressionRatios.sweep(s, 250))

  def ratio(ds: String, method: String): Double =
    ratioRows.find(r => r.dataset == ds && r.method == method).get.ratio

  test("§5.1: print compression ratios on 250-row mini-batches") {
    BenchUtil.report("Compression ratios (250-row mini-batches)",
      CompressionRatios.render(ratioRows))
    assert(ratioRows.nonEmpty)
  }

  test("§5.1 shape: TOC beats every LMC scheme on the moderate-sparsity datasets") {
    for (ds <- Seq("census-like", "imagenet-like", "kdd99-like");
         lmc <- Seq("CSR", "CVI", "DVI", "CLA"))
      assert(ratio(ds, "TOC") > ratio(ds, lmc), s"$ds: TOC vs $lmc")
  }

  test("§5.1 shape: TOC's best ratio is in the tens (paper: up to 51x, on Kdd99)") {
    val best = Seq("census-like", "imagenet-like", "mnist-like", "kdd99-like")
      .map(ds => ds -> ratio(ds, "TOC")).maxBy(_._2)
    assert(best._1 == "kdd99-like", s"best TOC ratio on ${best._1}")
    assert(best._2 > 20 && best._2 < 120, s"kdd TOC ratio ${best._2}")
  }

  test("§5.1 shape: on Rcv1 CSR is best and TOC is close; on Deep1B nobody compresses") {
    assert(ratio("rcv1-like", "CSR") > ratio("rcv1-like", "DVI"))
    assert(ratio("rcv1-like", "TOC") > 0.7 * ratio("rcv1-like", "CSR"))
    for (m <- Seq("TOC", "CSR", "CVI", "Gzip", "Snappy"))
      assert(ratio("deep1b-like", m) < 1.6, s"deep1b $m")
  }

  test("§5.1 shape: TOC is comparable to Gzip (ahead on imagenet, within ~35% elsewhere)") {
    assert(ratio("imagenet-like", "TOC") > ratio("imagenet-like", "Gzip"))
    // Paper: TOC ahead of Gzip on census/kdd and behind on mnist. Our
    // synthetic DEN byte streams are more LZ77-friendly than the real
    // datasets, compressing the TOC-vs-Gzip gaps into a ±35% band — the
    // comparability claim holds; the per-dataset sign is a recorded
    // deviation (EXPERIMENTS.md).
    for (ds <- Seq("census-like", "kdd99-like", "mnist-like")) {
      assert(ratio(ds, "TOC") > 0.65 * ratio(ds, "Gzip"), s"$ds: TOC not comparable to Gzip")
      assert(ratio(ds, "TOC") < 1.4 * ratio(ds, "Gzip"), s"$ds: TOC implausibly above Gzip")
    }
  }

  test("§5.1 shape: Mnist is TOC's weakest moderate-sparsity dataset (few repeats)") {
    val moderate = Seq("census-like", "imagenet-like", "kdd99-like", "mnist-like")
    assert(moderate.map(ds => ratio(ds, "TOC")).min == ratio("mnist-like", "TOC"))
  }

  test("§5.1: ratios grow with batch size for TOC (more sequences to share)") {
    val r50 = CompressionRatios.ratioFor(Datasets.census, 50, "TOC")
    val r250 = CompressionRatios.ratioFor(Datasets.census, 250, "TOC")
    assert(r250 > r50, s"ratio at 250 ($r250) should exceed at 50 ($r50)")
  }

  test("Figure 6 ablation: each encoding layer helps on every moderate dataset") {
    for (spec <- Seq(Datasets.census, Datasets.imagenet, Datasets.kdd99, Datasets.mnist)) {
      val a = CompressionRatios.ablationFor(spec, 250)
      BenchUtil.report(s"Ablation ${spec.name}",
        f"sparse=${a.sparse}%.2fx  sparse+logical=${a.sparseLogical}%.2fx  full=${a.full}%.2fx")
      assert(a.sparseLogical > a.sparse, s"${spec.name}: logical encoding must help")
      assert(a.full > a.sparseLogical, s"${spec.name}: physical encoding must help")
    }
  }

  lazy val opRows: Seq[MatrixOps.Row] =
    Seq(Datasets.census, Datasets.imagenet, Datasets.kdd99)
      .flatMap(s => MatrixOps.benchDataset(s))

  def opTime(ds: String, method: String, op: String): Double =
    opRows.find(r => r.dataset == ds && r.method == method && r.op == op).get.seconds

  test("§5.2: print matrix-op runtimes") {
    BenchUtil.report("Matrix op runtimes (250-row mini-batches)", MatrixOps.render(opRows))
    assert(opRows.nonEmpty)
  }

  test("§5.2 shape: general schemes are orders slower than TOC on A.*c") {
    for (ds <- Seq("census-like", "imagenet-like")) {
      assert(opTime(ds, "Gzip", "A.*c") > 50 * opTime(ds, "TOC", "A.*c"), s"$ds Gzip")
      assert(opTime(ds, "Snappy", "A.*c") > 10 * opTime(ds, "TOC", "A.*c"), s"$ds Snappy")
    }
  }

  test("§5.2 shape: TOC's A.v stays within a small factor of CSR (tree-build overhead)") {
    for (ds <- Seq("census-like", "imagenet-like", "kdd99-like"))
      assert(opTime(ds, "TOC", "A.v") < 20 * opTime(ds, "CSR", "A.v") + 1e-3, ds)
  }

  test("§5.2 shape: TOC beats Gzip on right/left multiplication where decompression bites") {
    // JDK inflate on a 136 KB census batch costs ~0.2 ms, so the gap only
    // opens where the batch is big enough for decompression to dominate
    // (imagenet, 1.8 MB); on the tiny batches TOC must stay in the same
    // ballpark (recorded as a deviation note in EXPERIMENTS.md).
    for (op <- Seq("A.M", "M.A")) {
      assert(opTime("imagenet-like", "TOC", op) < opTime("imagenet-like", "Gzip", op), op)
      assert(opTime("census-like", "TOC", op) < 5 * opTime("census-like", "Gzip", op), op)
    }
  }

  lazy val speedRows: Seq[CompressSpeed.Row] =
    Seq(Datasets.census, Datasets.imagenet, Datasets.kdd99)
      .flatMap(s => CompressSpeed.benchDataset(s))

  test("§5.4: print compression/decompression speed") {
    BenchUtil.report("Compression/decompression speed (250-row batch)",
      CompressSpeed.render(speedRows))
    assert(speedRows.nonEmpty)
  }

  test("§5.4 shape: TOC compresses faster than Gzip everywhere; decompresses faster on the larger batches") {
    for (ds <- Seq("census-like", "imagenet-like", "kdd99-like")) {
      def row(m: String) = speedRows.find(r => r.dataset == ds && r.method == m).get
      assert(row("TOC").compressSec < row("Gzip").compressSec, s"$ds compress")
      // JDK inflate is extremely fast on the tiny census batch; require the
      // paper's ordering where decompression volume matters and same
      // ballpark otherwise (deviation note in EXPERIMENTS.md).
      assert(row("TOC").decompressSec < 8 * row("Gzip").decompressSec, s"$ds decompress")
    }
    def row(ds: String, m: String) = speedRows.find(r => r.dataset == ds && r.method == m).get
    assert(row("imagenet-like", "TOC").decompressSec < row("imagenet-like", "Gzip").decompressSec)
    assert(row("kdd99-like", "TOC").decompressSec < row("kdd99-like", "Gzip").decompressSec)
  }
}
