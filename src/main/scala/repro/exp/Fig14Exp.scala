package repro.exp

import repro.core.{HTGM, Les3Index}
import repro.data.SetGen
import repro.embed.PTREmbedder
import repro.partition.L2P

/** Fig. 14 — TGM vs HTGM on power-law-similarity synthetic databases
  * (§7.7): the ratio of HTGM to TGM cost in (a) index access (cells
  * probed) and (b) computation (similarity calculations), as the
  * similarity skew α grows, for range queries. The paper's finding: HTGM
  * pays off when most sets are dissimilar (large α) — the coarse matrices
  * then prune whole sub-hierarchies — while under broad similarity
  * (small α) the extra levels are pure overhead.
  */
object Fig14Exp {

  final case class Row(alpha: Double, accessRatio: Double, computeRatio: Double,
                       fineGroups: Int, coarseGroups: Int)

  def run(alphas: Seq[Double] = Seq(1.0, 2.0, 3.0, 4.0, 5.0),
          nSets: Int = 10000, nTokens: Int = 20000, hotPool: Int = 60,
          fineTarget: Int = 128, coarseTarget: Int = 16,
          delta: Double = 0.7, nQueries: Int = 100, pairs: Int = 10000): Seq[Row] =
    alphas.map { alpha =>
      val db = SetGen.powerLawSim(alpha, nSets, nTokens, 20, hotPool)
      val l2p = L2P.partition(db, new PTREmbedder(nTokens),
        Harness.l2pConfig(db.length, fineTarget, pairs, restarts = 1))
      val fine = l2p.grouping
      // coarse level = the cascade level closest to the coarse target
      val coarse = l2p.levels.minBy(g => math.abs(g.nGroups - coarseTarget))
      val tgmIndex = new Les3Index(db, fine)
      val htgm = HTGM.build(db, Seq(coarse, fine))
      val queries = Harness.sampleQueries(db, nQueries)

      var tgmProbes = 0L; var tgmCands = 0L
      var hProbes = 0L; var hCands = 0L
      for (q <- queries) {
        val a = tgmIndex.range(q, delta)
        tgmProbes += a.stats.ubProbes; tgmCands += a.stats.candidates
        val b = htgm.range(q, delta)
        hProbes += b.stats.ubProbes; hCands += b.stats.candidates
      }
      Row(alpha, hProbes.toDouble / tgmProbes,
          hCands.toDouble / math.max(1L, tgmCands),
          fine.nGroups, coarse.nGroups)
    }

  def render(rows: Seq[Row]): String =
    Fmt.table("Fig 14: HTGM/TGM cost ratios vs similarity skew alpha (range d=0.7)",
      Seq("alpha", "access ratio", "compute ratio", "fine groups", "coarse groups"),
      rows.map(r => Seq(r.alpha.toString, f"${r.accessRatio}%.3f", f"${r.computeRatio}%.3f",
                        r.fineGroups.toString, r.coarseGroups.toString)))
}
