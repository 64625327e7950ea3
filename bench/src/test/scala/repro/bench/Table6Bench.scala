package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tin.TinGen

/** Table 6 — dataset characteristics of the synthetic lite-scale TINs. */
class Table6Bench extends AnyFunSuite {

  test("Table 6: dataset characteristics") {
    val t = Tables.table6()
    println(t)
    TinGen.all.foreach { p =>
      assert(t.contains(p.name))
      assert(Tables.streams(p.name).length === p.interactions)
    }
  }

  test("Table 6 shape: avg quantities track the paper") {
    def avg(name: String): Double = {
      val rs = Tables.streams(name); rs.iterator.map(_.q).sum / rs.length
    }
    assert(math.abs(avg("bitcoin") - 34.4) / 34.4 < 0.2)
    assert(math.abs(avg("ctu") - 19200.0) / 19200.0 < 0.2)
    assert(math.abs(avg("prosper") - 76.0) / 76.0 < 0.2)
    assert(math.abs(avg("flights") - 125.0) / 125.0 < 0.1)
    assert(avg("taxis") > 1.3 && avg("taxis") < 1.8)
  }
}
