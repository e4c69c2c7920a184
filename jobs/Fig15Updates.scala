package repro.jobs

import repro.exp.Fig15Exp

/** spark-submit entrypoint for Fig. 15 (update handling). */
object Fig15Updates {
  def main(args: Array[String]): Unit =
    println(Fig15Exp.render(Fig15Exp.run()))
}
