package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.AlertUseCase

/** Fig. 9 analog — smurfing alerts on the bitcoin-lite network. */
class UseCaseBench extends AnyFunSuite {

  test("Fig. 9 analog: provenance alerts on bitcoin") {
    // Paper: first 100K interactions, alert threshold 10K BTC, 89 alerts.
    // Lite scale carries ~1% of the paper's mass, so the threshold scales
    // to 100 BTC-equivalents (and the prefix to 50K interactions to keep
    // the sparse engine inside its budget).
    println(Tables.useCase("bitcoin", n = 50_000, threshold = 100.0))
  }

  test("alerts exist and respond to the threshold") {
    val rs = Tables.streams("bitcoin").take(50_000).toVector
    val low = AlertUseCase.run(rs, threshold = 50.0)
    val high = AlertUseCase.run(rs, threshold = 5000.0)
    assert(low.size >= high.size)
    assert(low.nonEmpty, "expected some alerts at the low threshold")
  }
}
