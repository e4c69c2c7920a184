package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{Fig12Exp, Fig13Exp}

/** Fig. 13 — disk-based comparison under the HDD cost model. */
class Fig13DiskBench extends AnyFunSuite {

  test("Fig 13: on disk, LES3 wins via contiguous group reads; brute force beats random-access baselines at low selectivity") {
    val rows = Fig13Exp.run()
    println(Fig12Exp.render("Fig 13: disk-based search latency (HDD model)", rows))
    for (dataset <- rows.map(_.dataset).distinct) {
      def total(method: String, query: String, param: Double): Double = {
        val r = rows.find(r => r.dataset == dataset && r.method == method &&
          r.query == query && r.param == param).get
        r.cpuMs + r.ioMs
      }
      // Robust paper-shape orderings at this scale: LES3 beats the
      // sequential scan (contiguous group reads skip most of the data) and
      // DualTrans by a wide margin; DualTrans's random R-node + candidate
      // access is the worst access pattern of all, losing even to the scan.
      assert(total("LES3", "knn", 10) < total("DualTrans", "knn", 10),
        s"$dataset LES3 ${total("LES3", "knn", 10)} vs DualTrans ${total("DualTrans", "knn", 10)}")
      assert(total("BruteForce", "knn", 10) < total("DualTrans", "knn", 10))
      assert(total("LES3", "range", 0.9) < total("BruteForce", "range", 0.9))
      assert(total("LES3", "knn", 10) < total("BruteForce", "knn", 10),
        s"$dataset LES3 knn ${total("LES3", "knn", 10)} vs brute ${total("BruteForce", "knn", 10)}")
      // InvIdx: the paper reports LES3 2–10x ahead at 65M–787M sets; at
      // laptop scale InvIdx's per-set filtering is genuinely competitive
      // (see EXPERIMENTS.md), so only a sanity band is asserted here.
      assert(total("LES3", "knn", 10) < total("InvIdx", "knn", 10) * 2.0,
        s"$dataset LES3 knn ${total("LES3", "knn", 10)} vs InvIdx ${total("InvIdx", "knn", 10)}")
      // InvIdx's kNN adaptation degrades sharply vs its own selective range
      // filtering (the paper's core critique of InvIdx for kNN).
      assert(total("InvIdx", "knn", 10) > total("InvIdx", "range", 0.9) * 3.0,
        s"$dataset InvIdx knn ${total("InvIdx", "knn", 10)} vs range ${total("InvIdx", "range", 0.9)}")
    }
  }
}
