package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Table2Exp

/** Table 2 — dataset statistics of the synthetic stand-ins, printed next
  * to the paper's originals (EXPERIMENTS.md records both).
  */
class Table2DatasetsBench extends AnyFunSuite {

  test("Table 2: synthetic stand-ins match the originals' shape") {
    val rows = Table2Exp.run()
    println(Table2Exp.render(rows))
    for (r <- rows) {
      // shape match: mean set size within 40% of the original
      assert(math.abs(r.measured.avgSize - r.paper.avgSize) / r.paper.avgSize < 0.4,
        s"${r.name}: avg ${r.measured.avgSize} vs paper ${r.paper.avgSize}")
      // |D| and |T| are intentionally scaled down
      assert(r.measured.nSets <= r.paper.nSets)
      assert(r.measured.nTokens <= r.paper.nTokens)
      assert(r.measured.minSize >= 1)
    }
  }
}
