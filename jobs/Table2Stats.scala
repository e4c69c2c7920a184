package repro.jobs

import repro.exp.Table2Exp

/** spark-submit entrypoint for Table 2 (dataset statistics). */
object Table2Stats {
  def main(args: Array[String]): Unit =
    println(Table2Exp.render(Table2Exp.run()))
}
