package repro.jobs

import repro.exp.{Fig12Exp, Fig13Exp}

/** spark-submit entrypoint for Fig. 13 (disk-based comparison, HDD model). */
object Fig13DiskSearch {
  def main(args: Array[String]): Unit =
    println(Fig12Exp.render("Fig 13: disk-based search latency (HDD model)", Fig13Exp.run()))
}
