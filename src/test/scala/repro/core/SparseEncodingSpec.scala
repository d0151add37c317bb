package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.DenseMatrix

class SparseEncodingSpec extends AnyFunSuite {

  /** The original table A of Figure 3 (0-based columns internally). */
  val figure3A: DenseMatrix = DenseMatrix.fromRows(Seq(
    Seq(1.1, 2.0, 3.0, 1.4),
    Seq(1.1, 2.0, 3.0, 0.0),
    Seq(0.0, 1.1, 3.0, 1.4),
    Seq(1.1, 2.0, 0.0, 0.0)))

  test("Figure 3: A → B drops zeros and prefixes column indexes") {
    val b = SparseEncoder.encode(figure3A)
    assert(b(0).toSeq == Seq(ColValue(0, 1.1), ColValue(1, 2.0), ColValue(2, 3.0), ColValue(3, 1.4)))
    assert(b(1).toSeq == Seq(ColValue(0, 1.1), ColValue(1, 2.0), ColValue(2, 3.0)))
    assert(b(2).toSeq == Seq(ColValue(1, 1.1), ColValue(2, 3.0), ColValue(3, 1.4)))
    assert(b(3).toSeq == Seq(ColValue(0, 1.1), ColValue(1, 2.0)))
  }

  test("encode/decode round-trips Figure 3's table") {
    assert(SparseEncoder.decode(SparseEncoder.encode(figure3A), 4) == figure3A)
  }

  test("all-zero rows encode to empty pair sequences") {
    val m = DenseMatrix.zeros(3, 5)
    val b = SparseEncoder.encode(m)
    assert(b.forall(_.isEmpty))
    assert(SparseEncoder.decode(b, 5) == m)
  }

  test("fully dense rows keep every column") {
    val m = DenseMatrix.fromRows(Seq(Seq(1.0, 2.0), Seq(3.0, 4.0)))
    assert(SparseEncoder.encode(m).forall(_.length == 2))
  }

  test("column indexes are strictly increasing within a row") {
    val m = DenseMatrix.rand(20, 30, seed = 5, sparsity = 0.4)
    SparseEncoder.encode(m).foreach { row =>
      assert(row.map(_.col).toSeq == row.map(_.col).toSeq.sorted)
      assert(row.map(_.col).distinct.length == row.length)
    }
  }

  test("randomized round-trip over varying sparsity") {
    for (sp <- Seq(0.0, 0.05, 0.3, 0.7, 1.0); seed <- 1 to 5) {
      val m = DenseMatrix.rand(17, 23, seed, sp)
      assert(SparseEncoder.decode(SparseEncoder.encode(m), 23) == m, s"sp=$sp seed=$seed")
    }
  }
}
