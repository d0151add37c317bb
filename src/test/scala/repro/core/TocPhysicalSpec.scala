package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TocPhysicalSpec extends AnyFunSuite {

  def physFor(rows: Array[Array[ColValue]], numCols: Int): TocPhysical =
    TocPhysical.encode(rows.length, numCols, PrefixTreeEncoder.encode(rows))

  test("Figure 3: value dictionary holds the distinct values in first-occurrence order") {
    val p = physFor(Fig3.tableB, 5)
    assert(p.dict.toSeq == Seq(1.1, 2.0, 3.0, 1.4))
  }

  test("Figure 3: I's column indexes and value indexes reproduce the figure") {
    val p = physFor(Fig3.tableB, 5)
    assert(p.iCols.toSeq == Seq(1, 2, 3, 4, 2))
    assert(p.iValIdx.toSeq == Seq(0, 1, 2, 3, 0)) // [1.1, 2, 3, 1.4, 1.1]
  }

  test("Figure 3: D's tokens concatenate the tuple codes; rowStarts delimit them") {
    val p = physFor(Fig3.tableB, 5)
    assert(p.tokens.toSeq == Seq(1, 2, 3, 4, 6, 3, 5, 8, 6))
    assert(p.rowStarts.toSeq == Seq(0, 4, 6, 8))
  }

  test("iPairs/dRows reconstruct the logical outputs") {
    val logical = PrefixTreeEncoder.encode(Fig3.tableB)
    val p = TocPhysical.encode(4, 5, logical)
    assert(p.iPairs.toSeq == logical.i.toSeq)
    assert(p.dRows.map(_.toSeq).toSeq == logical.d.map(_.toSeq).toSeq)
  }

  test("sizeBytes equals the serialized length exactly") {
    val p = physFor(Fig3.tableB, 5)
    assert(p.toBytes.length.toLong == p.sizeBytes)
  }

  test("toBytes/fromBytes round-trips every field") {
    val p = physFor(Fig3.tableB, 5)
    val q = TocPhysical.fromBytes(p.toBytes)
    assert(q.numRows == p.numRows && q.numCols == p.numCols)
    assert(q.dict.toSeq == p.dict.toSeq)
    assert(q.iCols.toSeq == p.iCols.toSeq)
    assert(q.iValIdx.toSeq == p.iValIdx.toSeq)
    assert(q.tokens.toSeq == p.tokens.toSeq)
    assert(q.rowStarts.toSeq == p.rowStarts.toSeq)
  }

  test("randomized physical round-trip") {
    val rng = new scala.util.Random(31337)
    for (trial <- 1 to 30) {
      val rows = Array.fill(rng.nextInt(30) + 1) {
        rng.shuffle((0 until 40).toList).take(rng.nextInt(12)).sorted
          .map(j => ColValue(j, (rng.nextInt(7) + 1) * 0.5)).toArray
      }
      val p = physFor(rows, 40)
      val q = TocPhysical.fromBytes(p.toBytes)
      assert(q.dRows.map(_.toSeq).toSeq == p.dRows.map(_.toSeq).toSeq, s"trial $trial")
      assert(q.iPairs.toSeq == p.iPairs.toSeq, s"trial $trial")
      assert(p.toBytes.length.toLong == p.sizeBytes, s"trial $trial")
    }
  }

  test("tables with all-zero rows keep row boundaries") {
    val rows: Array[Array[ColValue]] =
      Array(Array(ColValue(0, 1.0)), Array.empty, Array(ColValue(1, 2.0)), Array.empty)
    val p = physFor(rows, 3)
    assert(p.dRows.map(_.length).toSeq == Seq(1, 0, 1, 0))
    val q = TocPhysical.fromBytes(p.toBytes)
    assert(q.dRows.map(_.length).toSeq == Seq(1, 0, 1, 0))
  }
}
