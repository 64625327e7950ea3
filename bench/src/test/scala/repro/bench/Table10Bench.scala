package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tin.TinGen

/** Table 10 — overhead of how-provenance (path tracking) under LIFO. */
class Table10Bench extends AnyFunSuite {

  test("Table 10: path tracking in LIFO") {
    println(Tables.table10())
  }

  test("Table 10 shape: flights has by far the longest paths") {
    // Paper: avg path length 273 on Flights (tiny V, huge R) vs < 6
    // elsewhere — quantities are relayed many times through few vertices.
    val lens = TinGen.all.map(p => p.name -> Tables.runTable10(p.name)._2.avgPathLength).toMap
    assert(lens("flights") > 5 * lens("bitcoin"), lens.toString)
    assert(lens("flights") > 5 * lens("taxis"), lens.toString)
    assert(lens("flights") > 10 * lens("prosper"), lens.toString)
  }

  test("Table 10 shape: prosper paths are short (mostly newborn mass)") {
    // Paper: Prosper 0.06 — loans are freshly generated, rarely relayed.
    // (CTU is the one shape our mixed-traffic analog does not capture:
    // see EXPERIMENTS.md.)
    val prosper = Tables.runTable10("prosper")._2.avgPathLength
    val bitcoin = Tables.runTable10("bitcoin")._2.avgPathLength
    assert(prosper < 2.0, s"prosper $prosper")
    assert(prosper < bitcoin, s"prosper $prosper vs bitcoin $bitcoin")
  }

  test("Table 10 shape: path tracking costs only a small runtime factor") {
    // Paper: LIFO with paths is at most a few× plain LIFO (Bitcoin 3.1s→13.35s).
    val plain = Tables.table78Results(("bitcoin", "LIFO"))
    val traced = Tables.runTable10("bitcoin")._1
    if (plain.status == "ok" && traced.status == "ok")
      assert(traced.timeSec <= plain.timeSec * 10 + 0.5)
  }
}
