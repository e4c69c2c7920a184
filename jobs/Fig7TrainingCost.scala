package repro.jobs

import repro.data.SetGen
import repro.exp.Fig7Exp

/** spark-submit entrypoint for Fig. 7 (model convergence and training cost). */
object Fig7TrainingCost {
  def main(args: Array[String]): Unit = {
    println(Fig7Exp.renderCurves(Fig7Exp.learningCurves(
      Seq(SetGen.kosarakLite, SetGen.dblpLite, SetGen.aolLite))))
    println(Fig7Exp.renderCost(Fig7Exp.trainingCost(SetGen.kosarakLite)))
  }
}
