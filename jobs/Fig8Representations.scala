package repro.jobs

import repro.exp.Fig8Exp

/** spark-submit entrypoint for Fig. 8 (set-representation techniques). */
object Fig8Representations {
  def main(args: Array[String]): Unit =
    println(Fig8Exp.render(Fig8Exp.run()))
}
