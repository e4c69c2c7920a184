package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig10Exp

/** Fig. 10 — sensitivity to the number of groups n and to k. */
class Fig10SensitivityBench extends AnyFunSuite {

  test("Fig 10: more groups → better pruning; larger k → more work") {
    val rows = Fig10Exp.run()
    println(Fig10Exp.render(rows))
    val ns = rows.map(_.nGroups).distinct.sorted
    assert(ns.length >= 3, s"need several cascade levels, got $ns")

    // PE improves with n for k = 10 (paper: increasing n improves pruning
    // up to a point)
    val k10 = rows.filter(_.k == 10).sortBy(_.nGroups)
    assert(k10.last.peKnn > k10.head.peKnn,
      s"PE did not improve with n: ${k10.map(r => r.nGroups -> r.peKnn)}")
    // query time at the best n beats the coarsest level
    assert(k10.map(_.avgMs).min < k10.head.avgMs,
      s"no speedup from grouping: ${k10.map(r => r.nGroups -> r.avgMs)}")

    // larger k costs more at the finest level (paper: search time increases
    // with k)
    val finest = rows.filter(_.nGroups == ns.last).sortBy(_.k)
    assert(finest.last.avgMs >= finest.head.avgMs * 0.9,
      s"k=50 unexpectedly much cheaper than k=1: ${finest.map(r => r.k -> r.avgMs)}")
    assert(finest.last.peKnn <= finest.head.peKnn + 0.02,
      "PE should not improve with larger k")
  }
}
