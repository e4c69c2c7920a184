package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig15Exp

/** Fig. 15 — pruning efficiency under insertions vs re-build. */
class Fig15UpdatesBench extends AnyFunSuite {

  test("Fig 15: PE is resistant to insertions (paper: at most ~8% decrease)") {
    val rows = Fig15Exp.run()
    println(Fig15Exp.render(rows))
    for (r <- rows) {
      assert(r.peInsert > 0.15 && r.peRebuild > 0.15,
        s"${r.universe}@${r.insertRatio}: degenerate PE (${r.peInsert}, ${r.peRebuild})")
      // the paper reports ≤ 8%; allow headroom for the scaled-down setting
      assert(r.decreasePct < 25.0,
        s"${r.universe}@${r.insertRatio}: PE decrease ${r.decreasePct}%")
    }
    // overall, closed-universe insertions hurt no more than open-universe
    // ones (paper: open universe has the higher impact)
    val closedAvg = rows.filter(_.universe == "closed").map(_.decreasePct).sum / 4
    val openAvg = rows.filter(_.universe == "open").map(_.decreasePct).sum / 4
    assert(closedAvg <= openAvg + 5.0,
      s"closed avg $closedAvg should not exceed open avg $openAvg materially")
  }
}
