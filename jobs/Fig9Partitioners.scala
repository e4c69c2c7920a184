package repro.jobs

import repro.exp.Fig9Exp

/** spark-submit entrypoint for Fig. 9 (L2P vs algorithmic partitioners). */
object Fig9Partitioners {
  def main(args: Array[String]): Unit =
    println(Fig9Exp.render(Fig9Exp.run()))
}
