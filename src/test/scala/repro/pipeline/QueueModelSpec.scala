package repro.pipeline

import org.scalatest.funsuite.AnyFunSuite

class QueueModelSpec extends AnyFunSuite {

  test("io rate is bandwidth over mean image size (Lemma A.2)") {
    assert(QueueModel.ioRate(110e3 * 500, 110e3) == 500.0)
  }

  test("pipeline rate is the min of compute and io (Lemma A.4)") {
    assert(QueueModel.pipelineRate(450, 1000) == 450.0)
    assert(QueueModel.pipelineRate(450, 100) == 100.0)
  }

  test("sMax is the size ratio (Theorem 4.1)") {
    // Paper Table 1: ImageNet scan 5 is 2× smaller → 2× max speedup.
    assert(QueueModel.sMax(110e3, 55e3) == 2.0)
    assert(QueueModel.sMax(110e3, 110e3 / 16) == 16.0)
  }

  test("cluster rate saturates at the compute limit") {
    // 10 nodes × 450 img/s; tiny images make IO infinitely fast.
    assert(QueueModel.clusterRate(10, 450, 1e12, 1.0) == 4500.0)
  }

  test("cluster rate is IO-bound for heavy data (paper Fig 5 regime)") {
    // 400 MiB/s aggregate, 110 kB images → ~3.8k img/s < 10×450 compute.
    val r = QueueModel.clusterRate(10, 450, 400.0 * 1024 * 1024, 110e3)
    assert(math.abs(r - 400.0 * 1024 * 1024 / 110e3) < 1e-9)
    assert(r < 4500)
  }

  test("halving the data size doubles an IO-bound rate") {
    val w = 100e6
    val r1 = QueueModel.clusterRate(10, 1e9, w, 100e3)
    val r2 = QueueModel.clusterRate(10, 1e9, w, 50e3)
    assert(math.abs(r2 / r1 - 2.0) < 1e-12)
  }

  test("epoch seconds") {
    assert(QueueModel.epochSeconds(9000, 450) == 20.0)
    assertThrows[IllegalArgumentException](QueueModel.epochSeconds(1, 0))
  }

  test("stall fraction follows Amdahl's view (§4.1)") {
    assert(QueueModel.stallFraction(1000, 2000) == 0.0)
    assert(math.abs(QueueModel.stallFraction(1000, 500) - 0.5) < 1e-12)
  }

  test("invalid sizes are rejected") {
    assertThrows[IllegalArgumentException](QueueModel.ioRate(1e6, 0))
    assertThrows[IllegalArgumentException](QueueModel.sMax(0, 1))
  }
}
