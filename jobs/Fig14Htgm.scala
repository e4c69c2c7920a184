package repro.jobs

import repro.exp.Fig14Exp

/** spark-submit entrypoint for Fig. 14 (TGM vs HTGM). */
object Fig14Htgm {
  def main(args: Array[String]): Unit =
    println(Fig14Exp.render(Fig14Exp.run()))
}
