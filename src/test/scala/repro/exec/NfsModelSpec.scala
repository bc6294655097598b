package repro.exec

import org.scalatest.funsuite.AnyFunSuite

class NfsModelSpec extends AnyFunSuite {

  test("read and write costs include latency") {
    val m = NfsModel(100, 50, latencyMs = 2)
    assert(m.readMs(1000) == 2 + 10.0)
    assert(m.writeMs(1000) == 2 + 20.0)
  }

  test("zero bytes cost nothing") {
    val m = NfsModel(100, 50, 2)
    assert(m.readMs(0) == 0.0)
    assert(m.writeMs(-5) == 0.0)
  }

  test("scaledTo preserves the paper's read:write ratio") {
    val m = NfsModel.scaledTo(100L << 20)
    assert(math.abs(m.readBytesPerMs / m.writeBytesPerMs - NfsModel.ReadWriteRatio) < 1e-9)
  }

  test("scaledTo makes a full-dataset scan cost the target seconds") {
    val bytes = 50L << 20
    val m = NfsModel.scaledTo(bytes, fullReadSeconds = 8.0)
    assert(math.abs(m.readMs(bytes) - 8000.0) < 1.0)
  }

  test("toCostModel carries the storage parameters") {
    val m = NfsModel(100, 50, 2)
    val cm = m.toCostModel()
    assert(cm.diskReadBytesPerMs == 100)
    assert(cm.diskWriteBytesPerMs == 50)
    assert(cm.latencyMs == 2)
  }
}
