package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig12Exp

/** Fig. 12 — memory-based comparison vs DualTrans / InvIdx / brute force.
  * (All four methods are cross-checked for identical results inside the
  * sweep; the assertions here are about the performance shape.)
  */
class Fig12MemoryBench extends AnyFunSuite {

  test("Fig 12: LES3 leads for selective queries in memory") {
    val rows = Fig12Exp.run()
    println(Fig12Exp.render("Fig 12: memory-based search latency", rows))
    for (dataset <- rows.map(_.dataset).distinct) {
      def time(method: String, query: String, param: Double): Double = {
        val r = rows.find(r => r.dataset == dataset && r.method == method &&
          r.query == query && r.param == param).get
        r.cpuMs + r.ioMs
      }
      // selective range query: LES3 clearly beats brute force and DualTrans
      assert(time("LES3", "range", 0.9) < time("BruteForce", "range", 0.9),
        s"$dataset: LES3 ${time("LES3", "range", 0.9)} vs brute ${time("BruteForce", "range", 0.9)}")
      assert(time("LES3", "range", 0.9) < time("DualTrans", "range", 0.9))
      // kNN k=10: LES3 at least competitive with brute force (paper: 2–20x
      // faster; we require it not to lose)
      assert(time("LES3", "knn", 10) < time("BruteForce", "knn", 10) * 1.1,
        s"$dataset: LES3 knn ${time("LES3", "knn", 10)} vs brute ${time("BruteForce", "knn", 10)}")
      // DualTrans pays R-tree scan overhead on kNN (paper's argument)
      assert(time("LES3", "knn", 10) < time("DualTrans", "knn", 10))
    }
  }
}
