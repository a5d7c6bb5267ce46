package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.jobs.ApproxEval

/** Appendix A (Figures 21/22)-style approximation benchmarks on the WN and
  * TW counterparts: ApproxTBC{,+,++} over the sampling probability p and
  * sGrappTBC{,+,++} over the window parameter N_t^W.
  */
class ApproxBench extends AnyFunSuite {

  private val Keys = Seq("WN", "TW")

  test("ApproxTBC time and MAPE over p") {
    ApproxEval.approxSweep(Keys)
  }

  test("sGrappTBC time and MAPE over N_t^W") {
    ApproxEval.sgrappSweep(Keys)
  }
}
