package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SetGen
import repro.exp.Fig7Exp

/** Fig. 7 — model convergence and training cost. */
class Fig7TrainingBench extends AnyFunSuite {

  test("Fig 7(a): training loss decreases and converges within a few epochs") {
    val rows = Fig7Exp.learningCurves(
      Seq(SetGen.kosarakLite, SetGen.dblpLite, SetGen.aolLite), epochs = 8)
    println(Fig7Exp.renderCurves(rows))
    for (r <- rows) {
      val l = r.lossPerEpoch
      assert(l.last <= l.head, s"${r.dataset}: loss did not decrease (${l.mkString(",")})")
      // converged: the last three epochs move less than the first drop
      val firstDrop = math.abs(l.head - l(1))
      val tailMove = math.abs(l(l.length - 3) - l.last)
      assert(tailMove <= math.max(firstDrop, 1e-9) * 1.5,
        s"${r.dataset}: no convergence (${l.mkString(",")})")
    }
  }

  test("Fig 7(b): training cost grows roughly linearly with the group count") {
    val rows = Fig7Exp.trainingCost(SetGen.kosarakLite, targets = Seq(16, 32, 64, 128))
    println(Fig7Exp.renderCost(rows))
    assert(rows.map(_.modelsTrained) == rows.map(_.modelsTrained).sorted)
    // more groups → strictly more training time, and roughly linear in the
    // number of models (within 3x per model)
    assert(rows.last.trainMs > rows.head.trainMs)
    val perModel = rows.map(r => r.trainMs / r.modelsTrained)
    assert(perModel.max / perModel.min < 3.0,
      s"per-model cost far from linear: $perModel")
  }
}
