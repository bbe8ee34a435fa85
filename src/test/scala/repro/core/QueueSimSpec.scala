package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.throughput.{Lemma1, QueueSim, StageProfile}
import scala.util.Random

/** Throughput model: consistency with queueing theory (Lemma 1 / M/M/1)
  * and the paper's overload rules.
  */
class QueueSimSpec extends AnyFunSuite {

  private def expSamples(mean: Double, n: Int, seed: Long): Array[Double] = {
    val rnd = new Random(seed)
    Array.fill(n)(-mean * math.log(1.0 - rnd.nextDouble()))
  }

  test("M/M/1 sanity: simulated mean response matches 1/(mu - lambda)") {
    // Single always-available stage, exponential service, no update blackout.
    val mean = 0.001 // 1ms
    val stage = StageProfile(0.0, expSamples(mean, 5000, 1), "svc")
    val lambda = 500.0 // rho = 0.5 -> E[R] = 1/(1000-500) = 2ms
    val r = QueueSim.avgResponse(IndexedSeq(stage), deltaT = 1e9, lambda = lambda,
      seed = 7, maxArrivals = 400000)
    assert(math.abs(r - 0.002) < 0.0004, s"M/M/1 response $r, expected ~0.002")
  }

  test("maxThroughput is near the Lemma 1 bound for M/M/1") {
    val mean = 0.001
    val stage = StageProfile(0.0, expSamples(mean, 5000, 2), "svc")
    val rq = 0.01
    val sim = QueueSim.maxThroughput(IndexedSeq(stage), deltaT = 1e9, rqStar = rq, seed = 11)
    // For M/M/1, Vq = tq^2; first Lemma-1 term = 2(R-t)/(t^2+2Rt) with t=1ms.
    val bound = Lemma1.bound(mean, mean * mean, 0.0, 1e9, rq)
    assert(sim > 0.5 * bound && sim < 1.2 * bound, s"sim=$sim bound=$bound")
  }

  test("throughput is zero when the update exceeds the interval") {
    val stage = StageProfile(2.0, Array(1e-6), "late")
    assert(QueueSim.maxThroughput(IndexedSeq(stage), deltaT = 1.0, rqStar = 1.0) == 0.0)
  }

  test("throughput increases with QoS slack and with faster final stage") {
    val slow = StageProfile(0.0, Array.fill(100)(1e-3), "slow")
    val fast = StageProfile(0.0, Array.fill(100)(1e-5), "fast")
    val l1 = QueueSim.maxThroughput(IndexedSeq(slow), 10.0, 0.002, seed = 3)
    val l2 = QueueSim.maxThroughput(IndexedSeq(slow), 10.0, 0.02, seed = 3)
    val l3 = QueueSim.maxThroughput(IndexedSeq(fast), 10.0, 0.002, seed = 3)
    assert(l2 >= l1, s"QoS slack should not reduce throughput ($l1 -> $l2)")
    assert(l3 > l1 * 10, s"100x faster service should lift throughput ($l1 -> $l3)")
  }

  test("multi-stage beats single final stage with the same final speed (Figure 1 idea)") {
    // An index unavailable for 0.5 of each 1s period, final query 10us.
    val fin = Array.fill(200)(1e-5)
    val bidij = Array.fill(200)(5e-4)
    val single = IndexedSeq(StageProfile(0.5, fin, "H2H-only"))
    val multi = IndexedSeq(StageProfile(1e-4, bidij, "BiDij"), StageProfile(0.5, fin, "H2H"))
    val l1 = QueueSim.maxThroughput(single, 1.0, 0.01, seed = 5)
    val l2 = QueueSim.maxThroughput(multi, 1.0, 0.01, seed = 5)
    assert(l2 > l1, s"multi-stage $l2 should beat blackout-then-fast $l1")
  }

  test("Lemma 1 bound edge cases") {
    assert(Lemma1.bound(0.01, 0.0, 0.0, 1.0, 0.005) == 0.0) // R < tq
    assert(Lemma1.bound(0.001, 0.0, 2.0, 1.0, 0.1) == 0.0)  // tu >= deltaT
    val b = Lemma1.bound(0.001, 1e-6, 0.5, 1.0, 0.1)
    assert(b > 0 && b <= (1.0 - 0.5) / (0.001 * 1.0) + 1e-9)
  }

  test("stage availability blackout reduces throughput vs always-on") {
    val svc = Array.fill(200)(1e-4)
    val on = QueueSim.maxThroughput(IndexedSeq(StageProfile(0.0, svc, "on")), 1.0, 0.01, seed = 9)
    val black = QueueSim.maxThroughput(IndexedSeq(StageProfile(0.6, svc, "late")), 1.0, 0.01, seed = 9)
    assert(black < on, s"blackout $black should be below always-on $on")
  }
}
