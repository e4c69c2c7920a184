package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig14Exp

/** Fig. 14 — TGM vs HTGM across the similarity-skew sweep. */
class Fig14HtgmBench extends AnyFunSuite {

  test("Fig 14: HTGM pays off when most sets are dissimilar (large alpha)") {
    val rows = Fig14Exp.run()
    println(Fig14Exp.render(rows))
    val sorted = rows.sortBy(_.alpha)
    // the access-cost ratio must improve (decrease) as alpha grows
    assert(sorted.last.accessRatio < sorted.head.accessRatio,
      s"access ratio did not improve with alpha: ${sorted.map(r => r.alpha -> r.accessRatio)}")
    // at the most-dissimilar end, HTGM probes fewer cells than flat TGM
    assert(sorted.last.accessRatio < 1.0,
      s"HTGM never beat TGM on access cost: ${sorted.map(r => r.alpha -> r.accessRatio)}")
    // computation (verification) stays comparable — both engines are exact
    assert(rows.forall(r => r.computeRatio > 0.5 && r.computeRatio < 2.0),
      s"compute ratios out of band: ${rows.map(_.computeRatio)}")
  }
}
