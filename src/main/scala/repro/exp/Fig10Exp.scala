package repro.exp

import repro.core.Les3Index
import repro.data.SetGen
import repro.embed.PTREmbedder
import repro.partition.L2P

/** Fig. 10 — sensitivity of LES³ query time to the number of groups n and
  * the result size k. One cascade run provides every level's grouping
  * (2^i-style group counts), and a TGM is built per level — mirroring how
  * the paper derives n-sweeps from the cascade.
  */
object Fig10Exp {

  final case class Row(nGroups: Int, k: Int, avgMs: Double, peKnn: Double)

  def run(p: SetGen.Profile = SetGen.kosarakLite, maxGroups: Int = 512,
          ks: Seq[Int] = Seq(1, 10, 50), nQueries: Int = 200,
          pairs: Int = 20000): Seq[Row] = {
    val db = SetGen.local(p)
    val queries = Harness.sampleQueries(db, nQueries)
    val l2p = L2P.partition(db, new PTREmbedder(p.nTokens),
      Harness.l2pConfig(db.length, maxGroups, pairs, restarts = 2))

    // Distinct group counts across cascade levels (skip the init level's
    // trivial counts below 8 groups).
    val levelChoices = l2p.levels.filter(_.nGroups >= 8)
      .groupBy(_.nGroups).map(_._2.head).toSeq.sortBy(_.nGroups)

    for (g <- levelChoices; k <- ks) yield {
      val index = new Les3Index(db, g)
      val avg = Harness.avgMs(queries.toSeq)(q => index.knn(q, k))
      val pe = Harness.meanPeKnn(index, queries.toSeq.take(50), k)
      Row(g.nGroups, k, avg, pe)
    }
  }

  def render(rows: Seq[Row]): String =
    Fmt.table("Fig 10: sensitivity to number of groups and k (KOSARAK-lite)",
      Seq("nGroups", "k", "avg kNN ms", "PE"),
      rows.map(r => Seq(r.nGroups.toString, r.k.toString, Fmt.ms(r.avgMs), Fmt.pct(r.peKnn))))
}
