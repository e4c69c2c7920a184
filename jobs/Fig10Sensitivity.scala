package repro.jobs

import repro.exp.Fig10Exp

/** spark-submit entrypoint for Fig. 10 (sensitivity to n and k). */
object Fig10Sensitivity {
  def main(args: Array[String]): Unit =
    println(Fig10Exp.render(Fig10Exp.run()))
}
