package repro.jobs

import repro.exp.Fig11Exp

/** spark-submit entrypoint for Fig. 11 (index size and construction time). */
object Fig11IndexCost {
  def main(args: Array[String]): Unit =
    println(Fig11Exp.render(Fig11Exp.run()))
}
