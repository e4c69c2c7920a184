package repro.exp

import repro.data.SetGen

/** Table 2 — dataset statistics, for the synthetic stand-ins next to the
  * paper's originals (see DESIGN.md for the substitution rationale).
  */
object Table2Exp {

  /** Paper-reported statistics for the original dataset. */
  final case class PaperStats(nSets: Long, maxSize: Int, minSize: Int,
                              avgSize: Double, nTokens: Long)

  val paper: Map[String, PaperStats] = Map(
    "KOSARAK-lite" -> PaperStats(990002L, 2498, 1, 8.1, 41270L),
    "LIVEJ-lite"   -> PaperStats(3201202L, 300, 1, 35.1, 7489073L),
    "DBLP-lite"    -> PaperStats(5875251L, 462, 2, 8.7, 3720067L),
    "AOL-lite"     -> PaperStats(10154742L, 245, 1, 3.0, 3849555L),
    "FS-lite"      -> PaperStats(65608366L, 3615, 1, 27.5, 65608366L),
    "PMC-lite"     -> PaperStats(787220474L, 2597, 1, 8.8, 22923401L),
  )

  final case class Row(name: String, paper: PaperStats, measured: SetGen.Stats)

  def run(profiles: Seq[SetGen.Profile] = SetGen.table2Profiles): Seq[Row] =
    profiles.map { p =>
      Row(p.name, paper(p.name), SetGen.stats(SetGen.local(p)))
    }

  def render(rows: Seq[Row]): String =
    Fmt.table("Table 2: dataset statistics (paper original vs synthetic stand-in)",
      Seq("dataset", "|D| paper", "|D| ours", "avg paper", "avg ours",
          "max paper", "max ours", "min paper", "min ours", "|T| paper", "|T| ours"),
      rows.map { r =>
        Seq(r.name, r.paper.nSets.toString, r.measured.nSets.toString,
            f"${r.paper.avgSize}%.1f", f"${r.measured.avgSize}%.1f",
            r.paper.maxSize.toString, r.measured.maxSize.toString,
            r.paper.minSize.toString, r.measured.minSize.toString,
            r.paper.nTokens.toString, r.measured.nTokens.toString)
      })
}
