package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig11Exp

/** Fig. 11 — index size and construction time. */
class Fig11IndexCostBench extends AnyFunSuite {

  test("Fig 11: the TGM is far smaller than DualTrans and InvIdx indexes") {
    val rows = Fig11Exp.run()
    println(Fig11Exp.render(rows))
    for (dataset <- rows.map(_.dataset).distinct) {
      val byName = rows.filter(_.dataset == dataset).map(r => r.method -> r).toMap
      val tgm = byName("LES3(TGM)")
      // paper: up to 90% less space; require at least 50% less
      assert(tgm.sizeBytes < byName("DualTrans").sizeBytes / 2,
        s"$dataset: TGM ${tgm.sizeBytes} vs DualTrans ${byName("DualTrans").sizeBytes}")
      assert(tgm.sizeBytes < byName("InvIdx").sizeBytes / 2,
        s"$dataset: TGM ${tgm.sizeBytes} vs InvIdx ${byName("InvIdx").sizeBytes}")
      // construction cost is dominated by (one-time) model training, and is
      // allowed to exceed the baselines' build time (paper Fig. 11)
      assert(tgm.buildMs > 0 && byName("InvIdx").buildMs > 0)
    }
  }
}
