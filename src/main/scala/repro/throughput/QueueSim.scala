package repro.throughput

import scala.util.Random

/** Empirical profile of one query stage: opens `availableFrom` seconds
  * after each batch arrival; service times drawn from measured `samples`.
  */
final case class StageProfile(availableFrom: Double, samples: Array[Double], label: String) {
  require(samples.nonEmpty)
  def mean: Double = samples.sum / samples.length
  def variance: Double = {
    val m = mean
    samples.map(x => (x - m) * (x - m)).sum / samples.length
  }
}

/** The paper's system model (§II) as a seeded discrete-event simulation:
  * time is divided into periods of δt seconds; an update batch arrives at
  * each period start and the index is unavailable until the first stage
  * opens; queries arrive Poisson(λ), queue FIFO, and are served by the
  * fastest stage open at service start. Used to find the maximum average
  * throughput λ*q under the QoS constraint R*q on mean response time.
  */
object QueueSim {

  /** Mean query response time at arrival rate `lambda`; simulates whole
    * periods, capping total arrivals for tractability (≥ `minPeriods`).
    * Returns Double.PositiveInfinity if the system is overloaded (server
    * cannot keep up within the horizon).
    */
  def avgResponse(stages: IndexedSeq[StageProfile], deltaT: Double, lambda: Double,
                  seed: Long, maxArrivals: Int = 1000000, minPeriods: Int = 2,
                  maxPeriods: Int = 10): Double = {
    require(stages.nonEmpty && lambda > 0)
    val sorted = stages.sortBy(_.availableFrom)
    val periods = math.max(minPeriods,
      math.min(maxPeriods, (maxArrivals / math.max(1.0, lambda * deltaT)).toInt))
    val horizon = periods * deltaT
    val rnd = new Random(seed)
    var arrival = 0.0
    var serverFree = 0.0
    var totalResp = 0.0
    var served = 0L
    val opens = sorted.map(_.availableFrom)
    // `maxArrivals` bounds the loop directly as well: with a very large
    // deltaT (tests disable blackouts that way) the horizon alone would
    // admit astronomically many arrivals.
    while (arrival < horizon && served < maxArrivals) {
      arrival += -math.log(1.0 - rnd.nextDouble()) / lambda
      if (arrival < horizon) {
        var start = math.max(arrival, serverFree)
        // wait for the first stage of the current period to open
        val periodStart = math.floor(start / deltaT) * deltaT
        if (start - periodStart < opens.head) start = periodStart + opens.head
        // fastest open stage at service start
        val within = start - math.floor(start / deltaT) * deltaT
        var si = 0
        var j = 1
        while (j < sorted.length) { if (opens(j) <= within) si = j; j += 1 }
        val svc = sorted(si).samples(rnd.nextInt(sorted(si).samples.length))
        serverFree = start + svc
        totalResp += serverFree - arrival
        served += 1
        // overload short-circuit: queue delay beyond 100 periods
        if (serverFree - arrival > 100 * deltaT) return Double.PositiveInfinity
      }
    }
    if (served == 0) Double.PositiveInfinity else totalResp / served
  }

  /** Maximum average throughput λ*q such that mean response ≤ `rqStar`,
    * or 0 when the update cannot be installed within δt (the paper's
    * overload rule: the system spends all its time updating).
    */
  def maxThroughput(stages: IndexedSeq[StageProfile], deltaT: Double, rqStar: Double,
                    seed: Long = 12345): Double = {
    if (stages.isEmpty) return 0.0
    val tU = stages.map(_.availableFrom).max
    if (tU >= deltaT) return 0.0
    def ok(lambda: Double): Boolean =
      avgResponse(stages, deltaT, lambda, seed, maxArrivals = 300000) <= rqStar
    // find an upper bracket
    var lo = 0.0
    var hi = 1.0
    var tries = 0
    while (ok(hi) && tries < 40) { lo = hi; hi *= 2; tries += 1 }
    if (tries == 40) return hi // effectively unbounded at this resolution
    if (lo == 0.0 && !ok(hi)) {
      // even 1 qps may violate; search down
      var probe = hi
      var inner = 0
      while (!ok(probe) && inner < 30) { probe /= 2; inner += 1 }
      if (inner == 30) return 0.0
      lo = probe
    }
    var iter = 0
    while (iter < 25 && (hi - lo) > 0.02 * hi) {
      val mid = (lo + hi) / 2
      if (ok(mid)) lo = mid else hi = mid
      iter += 1
    }
    lo
  }
}

/** Lemma 1 closed-form bound — used to sanity-check the simulator. */
object Lemma1 {
  /** λ*q ≤ min( 2(R-t_q) / (V_q + 2·R·t_q − t_q²), (δt − t_u) / (t_q·δt) ). */
  def bound(tQ: Double, vQ: Double, tU: Double, deltaT: Double, rQ: Double): Double = {
    if (rQ <= tQ || tU >= deltaT) return 0.0
    val a = 2 * (rQ - tQ) / (vQ + 2 * rQ * tQ - tQ * tQ)
    val b = (deltaT - tU) / (tQ * deltaT)
    math.min(a, b)
  }
}
