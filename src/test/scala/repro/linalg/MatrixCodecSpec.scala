package repro.linalg

import org.scalatest.funsuite.AnyFunSuite

class MatrixCodecSpec extends AnyFunSuite {

  val a = DenseMatrix.rand(30, 12, seed = 41, sparsity = 0.5)

  for (enc <- Encodings.all) {
    test(s"${enc.name}: serialize/deserialize preserves decode and ops") {
      val c = enc.encode(a)
      val back = MatrixCodec.deserialize(MatrixCodec.serialize(c))
      assert(back.decode == a)
      val v = Array.tabulate(12)(i => i * 0.1)
      back.timesVector(v).zip(a.timesVector(v)).foreach { case (g, w) =>
        assert(math.abs(g - w) < 1e-9)
      }
    }
  }

  test("TOC is framed with its physical byte layout (tag 1), not JDK serialization") {
    val bytes = MatrixCodec.serialize(Encodings.byName("TOC").encode(a))
    assert(bytes(0) == 1.toByte)
    // far smaller than JDK object framing of a dense batch
    assert(bytes.length < MatrixCodec.serialize(Encodings.byName("DEN").encode(a)).length)
  }

  test("unknown tag is rejected") {
    intercept[IllegalArgumentException](MatrixCodec.deserialize(Array[Byte](42, 0, 0)))
  }

  test("vector framing round-trips") {
    val v = Array(1.5, -2.5, 0.0, 3.25)
    assert(MatrixCodec.deserializeVector(MatrixCodec.serializeVector(v)).toSeq == v.toSeq)
    assert(MatrixCodec.deserializeVector(MatrixCodec.serializeVector(Array.empty)).isEmpty)
  }
}
