package repro.jobs

import repro.exp.Fig12Exp

/** spark-submit entrypoint for Fig. 12 (memory-based baseline comparison). */
object Fig12MemorySearch {
  def main(args: Array[String]): Unit =
    println(Fig12Exp.render("Fig 12: memory-based search latency", Fig12Exp.run()))
}
