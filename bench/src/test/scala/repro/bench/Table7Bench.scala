package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tin.TinGen

/** Table 7 — runtime of each selection policy on each dataset. */
class Table7Bench extends AnyFunSuite {

  test("Table 7: runtime per policy") {
    println(Tables.table7())
    Tables.table78Results.foreach { case ((d, c), r) =>
      assert(Set("ok", "mem", "time").contains(r.status), s"$d/$c")
    }
  }

  test("Table 7 shape: NoProv is the fastest policy on every dataset") {
    TinGen.all.foreach { p =>
      val noProv = Tables.table78Results((p.name, "NoProv"))
      assert(noProv.status === "ok", p.name)
      Harness.PolicyColumns.filterNot(_ == "NoProv").foreach { c =>
        val r = Tables.table78Results((p.name, c))
        if (r.status == "ok")
          assert(noProv.timeSec <= r.timeSec * 1.5 + 0.05, s"${p.name}/$c")
      }
    }
  }

  test("Table 7 shape: receipt-order beats generation-time (no heap)") {
    // Paper: LIFO/FIFO are faster than LRB/MRB on every dataset. Allow
    // generous slack — JVM timing jitter at lite scale.
    TinGen.all.foreach { p =>
      val lifo = Tables.table78Results((p.name, "LIFO"))
      val lrb = Tables.table78Results((p.name, "LRB"))
      if (lifo.status == "ok" && lrb.status == "ok")
        assert(lifo.timeSec <= lrb.timeSec * 2.0 + 0.1, p.name)
    }
  }

  test("Table 7 shape: ordered policies complete even on the largest TIN") {
    Seq("LRB", "MRB", "LIFO", "FIFO").foreach { c =>
      assert(Tables.table78Results(("bitcoin", c)).status === "ok", c)
    }
  }

  test("Table 7 shape: dense proportional works only on small-V networks") {
    assert(Tables.table78Results(("flights", "PropDense")).status === "ok")
    assert(Tables.table78Results(("taxis", "PropDense")).status === "ok")
    assert(Tables.table78Results(("bitcoin", "PropDense")).status !== "ok")
    assert(Tables.table78Results(("ctu", "PropDense")).status !== "ok")
  }
}
