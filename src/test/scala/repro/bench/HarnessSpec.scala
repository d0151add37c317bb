package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.io.StorageSim

/** Unit coverage for the table harness logic itself (the bench project
  * exercises it at full scale).
  */
class HarnessSpec extends AnyFunSuite {

  test("memoryBudget lies strictly between TOC's and the smallest LMC size") {
    val sizes = Map("TOC" -> 100L, "DEN" -> 10000L, "CSR" -> 5000L,
                    "CVI" -> 2000L, "DVI" -> 3000L)
    val b = EndToEnd.memoryBudget(sizes)
    assert(b > 100L && b < 2000L)
  }

  test("EndToEnd on a tiny config produces all method rows with the fit pattern") {
    val cfg = EndToEnd.Config(Datasets.kdd99, smallRows = 600, epochs = 1)
    val res = EndToEnd.run(cfg, spark = None)
    assert(res.rows.map(_.method) == EndToEnd.localMethods)
    val byName = res.rows.map(r => r.method -> r).toMap
    assert(byName("TOC").fitsLarge)
    assert(!byName("CVI").fitsLarge)
    // large totals include the modeled IO for spilling methods
    val sim = StorageSim(res.memoryBudgetBytes, cfg.diskMbPerSec * 1024 * 1024)
    val cvi = byName("CVI")
    val expectedIo = sim.totalIoSeconds(cvi.encodedBytes * cfg.largeScale, cfg.epochs)
    assert(math.abs(cvi.lr.largeTotalSec - (cvi.lr.computeSec * cfg.largeScale + expectedIo)) < 1e-6)
  }

  test("speedupLarge is the ratio of large totals") {
    val cfg = EndToEnd.Config(Datasets.kdd99, smallRows = 600, epochs = 1)
    val res = EndToEnd.run(cfg, spark = None)
    val toc = res.rows.find(_.method == "TOC").get
    val den = res.rows.find(_.method == "DEN").get
    val s = EndToEnd.speedupLarge(res, "DEN", "LR")
    assert(math.abs(s - den.lr.largeTotalSec / toc.lr.largeTotalSec) < 1e-9)
  }

  test("Table5.measure extrapolates text size from the sampled rows") {
    val r = Table5.measure(Datasets.kdd99, sampleRows = 500)
    assert(r.analogRows == Table5.analogRows("kdd99-like"))
    assert(r.textBytesAtAnalogScale > 0)
  }

  test("CompressionRatios.sweep covers every registered method") {
    val rows = CompressionRatios.sweep(Datasets.kdd99, 100)
    assert(rows.map(_.method) == repro.linalg.Encodings.all.map(_.name))
    assert(rows.forall(_.ratio > 0))
  }
}
