package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.DenseMatrix

/** Algorithms 3–8 checked against the dense reference kernels, including
  * the Figure 3 example and randomized matrices across sparsity regimes.
  */
class TocMatrixSpec extends AnyFunSuite {

  val eps = 1e-9

  def assertVec(got: Array[Double], want: Array[Double]): Unit = {
    assert(got.length == want.length)
    got.zip(want).zipWithIndex.foreach { case ((g, w), i) =>
      assert(math.abs(g - w) <= eps * math.max(1.0, math.abs(w)), s"index $i: $g vs $w")
    }
  }

  def assertMat(got: DenseMatrix, want: DenseMatrix): Unit = {
    assert(got.rows == want.rows && got.cols == want.cols)
    assertVec(got.data, want.data)
  }

  test("Figure 3 matrix: decode(encode(A)) == A (lossless)") {
    val a = Fig3.tableA
    assert(TocEncoder.encode(a).decode == a)
  }

  test("Figure 3 matrix: A·v matches the dense kernel") {
    val a = Fig3.tableA
    val v = Array(1.0, -2.0, 0.5, 3.0)
    assertVec(TocEncoder.encode(a).timesVector(v), a.timesVector(v))
  }

  test("Theorem 1 by hand on Figure 3: row sums via F decomposition") {
    // v = ones → A·v = row sums.
    val a = Fig3.tableA
    val ones = Array.fill(4)(1.0)
    assertVec(TocEncoder.encode(a).timesVector(ones),
      Array(1.1 + 2 + 3 + 1.4, 1.1 + 2 + 3, 1.1 + 3 + 1.4, 1.1 + 2))
  }

  test("Figure 3 matrix: v·A matches the dense kernel") {
    val a = Fig3.tableA
    val v = Array(0.5, 1.0, -1.0, 2.0)
    assertVec(TocEncoder.encode(a).vectorTimes(v), a.vectorTimes(v))
  }

  test("Figure 3 matrix: A·M matches the dense kernel") {
    val a = Fig3.tableA
    val m = DenseMatrix.rand(4, 3, seed = 11)
    assertMat(TocEncoder.encode(a).timesMatrix(m), a.timesMatrix(m))
  }

  test("Figure 3 matrix: M·A matches the dense kernel") {
    val a = Fig3.tableA
    val m = DenseMatrix.rand(3, 4, seed = 12)
    assertMat(TocEncoder.encode(a).leftTimes(m), a.leftTimes(m))
  }

  test("Algorithm 3: A.*c scales in compressed form without re-encoding") {
    val a = Fig3.tableA
    val scaled = TocEncoder.encode(a).timesScalar(2.5)
    assert(scaled.isInstanceOf[TocMatrix])
    assertMat(scaled.decode, a.timesScalar(2.5))
    // tokens/structure untouched — only the dictionary changed
    assert(scaled.physical.tokens.toSeq == TocEncoder.encode(a).physical.tokens.toSeq)
  }

  test("§4.5: sparse-unsafe A.+c decodes then operates") {
    val a = Fig3.tableA
    assertMat(TocEncoder.encode(a).plusScalar(1.5), a.plusScalar(1.5))
  }

  test("serialization round-trip preserves all op results") {
    val a = DenseMatrix.rand(30, 20, seed = 9, sparsity = 0.4)
    val toc = TocEncoder.encode(a)
    val back = TocEncoder.fromBytes(toc.toBytes)
    val v = Array.tabulate(20)(i => math.sin(i.toDouble))
    assertVec(back.timesVector(v), a.timesVector(v))
    assert(back.decode == a)
  }

  // Randomized conformance across sparsity regimes, with quantized values
  // (TOC's target regime) and continuous values (worst case).
  for {
    sparsity <- Seq(0.05, 0.3, 0.7, 1.0)
    quantized <- Seq(true, false)
  } test(f"random matrix sparsity=$sparsity%.2f quantized=$quantized: all ops match dense") {
    val rng = new scala.util.Random((sparsity * 100).toInt + (if (quantized) 1 else 0))
    val rows = 40; val cols = 25
    val data = Array.fill(rows * cols) {
      if (rng.nextDouble() < sparsity) {
        if (quantized) (rng.nextInt(5) + 1) * 0.5 else rng.nextDouble() * 10 - 5
      } else 0.0
    }
    val a = new DenseMatrix(rows, cols, data)
    val toc = TocEncoder.encode(a)
    assert(toc.decode == a)
    val v = Array.fill(cols)(rng.nextDouble() - 0.5)
    val u = Array.fill(rows)(rng.nextDouble() - 0.5)
    val m = DenseMatrix.rand(cols, 6, seed = 21)
    val ml = DenseMatrix.rand(6, rows, seed = 22)
    assertVec(toc.timesVector(v), a.timesVector(v))
    assertVec(toc.vectorTimes(u), a.vectorTimes(u))
    assertMat(toc.timesMatrix(m), a.timesMatrix(m))
    assertMat(toc.leftTimes(ml), a.leftTimes(ml))
    assertMat(toc.timesScalar(-1.5).decode, a.timesScalar(-1.5))
  }

  test("all-zero matrix: every op yields zeros") {
    val a = DenseMatrix.zeros(10, 8)
    val toc = TocEncoder.encode(a)
    assert(toc.decode == a)
    assert(toc.timesVector(Array.fill(8)(3.0)).forall(_ == 0.0))
    assert(toc.vectorTimes(Array.fill(10)(3.0)).forall(_ == 0.0))
    assert(toc.sizeBytes < a.denSizeBytes)
  }

  test("1x1 matrices") {
    for (v <- Seq(0.0, 4.2)) {
      val a = new DenseMatrix(1, 1, Array(v))
      val toc = TocEncoder.encode(a)
      assert(toc.decode == a)
      assertVec(toc.timesVector(Array(2.0)), Array(2.0 * v))
    }
  }

  test("repetitive rows compress far below DEN (the §5.1 regime)") {
    // 200 rows drawn from 4 templates with quantized values.
    val rng = new scala.util.Random(55)
    val templates = Array.fill(4)(Array.fill(30)(
      if (rng.nextDouble() < 0.5) (rng.nextInt(4) + 1) * 0.25 else 0.0))
    val rows = Array.tabulate(200)(i => templates(i % 4).clone())
    val a = new DenseMatrix(200, 30, rows.flatten)
    val toc = TocEncoder.encode(a)
    val ratio = a.denSizeBytes.toDouble / toc.sizeBytes
    assert(ratio > 10.0, s"expected strong compression, got ${ratio}x")
    assert(toc.decode == a)
  }

  test("ablation size ordering: full <= sparse+logical <= sparse for repetitive data") {
    val rng = new scala.util.Random(56)
    val template = Array.fill(40)(if (rng.nextDouble() < 0.5) (rng.nextInt(3) + 1) * 0.5 else 0.0)
    val a = new DenseMatrix(100, 40, Array.fill(100)(template).flatten)
    val sparse = TocEncoder.sparseOnlySizeBytes(a)
    val logical = TocEncoder.sparseLogicalSizeBytes(a)
    val full = TocEncoder.encode(a).sizeBytes
    assert(logical < sparse)
    assert(full < logical)
  }
}
