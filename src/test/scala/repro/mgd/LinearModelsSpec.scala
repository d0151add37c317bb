package repro.mgd

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.DenEncoder
import repro.linalg.{DenseMatrix, Encodings}

class LinearModelsSpec extends AnyFunSuite {

  /** A linearly separable toy batch. */
  def toyBatch(encoderName: String = "DEN"): MiniBatch = {
    val x = DenseMatrix.fromRows(Seq(
      Seq(1.0, 2.0), Seq(2.0, 1.0), Seq(-1.0, -2.0), Seq(-2.0, -1.0),
      Seq(1.5, 1.5), Seq(-1.5, -1.5)))
    val y = Array(1.0, 1.0, 0.0, 0.0, 1.0, 0.0)
    MiniBatch(Encodings.byName(encoderName).encode(x), y)
  }

  test("MiniBatch validates row/label agreement") {
    val x = DenEncoder.encode(DenseMatrix.zeros(3, 2))
    intercept[IllegalArgumentException](MiniBatch(x, Array(1.0)))
  }

  test("LR loss decreases over gradient steps") {
    val b = toyBatch()
    val m = new LogisticRegression(2)
    val l0 = m.loss(b)
    (1 to 50).foreach(_ => m.step(b, 0.5))
    assert(m.loss(b) < l0 / 2)
  }

  test("LR gradient matches a finite-difference check") {
    val b = toyBatch()
    val m = new LogisticRegression(2)
    val w0 = m.params
    // Analytic step with lr=1 gives w1 = w0 − g, so g = w0 − w1.
    m.step(b, 1.0)
    val g = w0.zip(m.params).map { case (a0, a1) => a0 - a1 }
    val h = 1e-6
    for (j <- 0 until 2) {
      val mp = new LogisticRegression(2); val pp = w0.clone(); pp(j) += h; mp.setParams(pp)
      val mm = new LogisticRegression(2); val pm = w0.clone(); pm(j) -= h; mm.setParams(pm)
      val fd = (mp.loss(b) - mm.loss(b)) / (2 * h)
      assert(math.abs(fd - g(j)) < 1e-4, s"coord $j: fd=$fd analytic=${g(j)}")
    }
  }

  test("SVM loss decreases over gradient steps") {
    val b = toyBatch()
    val m = new Svm(2)
    val l0 = m.loss(b)
    (1 to 50).foreach(_ => m.step(b, 0.1))
    assert(m.loss(b) < l0)
  }

  test("SVM rows with margin >= 1 contribute no gradient") {
    val b = toyBatch()
    val m = new Svm(2)
    m.setParams(Array(10.0, 10.0)) // every margin far beyond 1
    val before = m.params
    m.step(b, 0.5)
    assert(m.params.toSeq == before.toSeq)
  }

  test("params/setParams round-trip for LR and SVM") {
    for (m <- Seq(new LogisticRegression(5), new Svm(5))) {
      val p = Array.tabulate(5)(_ * 0.3)
      m.setParams(p)
      assert(m.params.toSeq == p.toSeq)
    }
  }

  test("copyModel is independent of the original") {
    val m = new LogisticRegression(3)
    val c = m.copyModel
    m.setParams(Array(9.0, 9.0, 9.0))
    assert(c.params.toSeq != m.params.toSeq)
  }

  for (encName <- Encodings.all.map(_.name)) {
    test(s"LR gradient step over $encName equals the DEN step (same trajectory)") {
      val bDen = toyBatch("DEN")
      val bEnc = toyBatch(encName)
      val mDen = new LogisticRegression(2)
      val mEnc = new LogisticRegression(2)
      (1 to 10).foreach { _ => mDen.step(bDen, 0.3); mEnc.step(bEnc, 0.3) }
      mDen.params.zip(mEnc.params).foreach { case (d, e) =>
        assert(math.abs(d - e) < 1e-8, s"$encName diverged")
      }
    }
  }

  test("OneVsRest trains k independent binary models") {
    val x = DenseMatrix.fromRows(Seq(
      Seq(2.0, 0.0), Seq(0.0, 2.0), Seq(-2.0, -2.0),
      Seq(2.2, 0.1), Seq(0.1, 2.2), Seq(-2.1, -1.9)))
    val y = Array(0.0, 1.0, 2.0, 0.0, 1.0, 2.0)
    val b = MiniBatch(DenEncoder.encode(x), y)
    val m = new OneVsRest(3, _ => new LogisticRegression(2))
    val l0 = m.loss(b)
    (1 to 80).foreach(_ => m.step(b, 0.5))
    assert(m.loss(b) < l0)
    assert(m.params.length == 6)
    val c = m.copyModel
    assert(c.params.toSeq == m.params.toSeq)
    c.setParams(Array.fill(6)(0.0))
    assert(m.params.exists(_ != 0.0))
  }
}
