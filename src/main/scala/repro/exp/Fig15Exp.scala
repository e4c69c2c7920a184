package repro.exp

import repro.core.Les3Index
import repro.data.SetGen


/** Fig. 15 — update handling (§6/§7.8): pruning-efficiency decrease of
  * insert-into-existing-index vs re-running L2P from scratch on the
  * enlarged database, for closed- and open-universe insertions at
  * increasing insertion ratios. The paper reports at most ~8% decrease.
  */
object Fig15Exp {

  final case class Row(universe: String, insertRatio: Double,
                       peInsert: Double, peRebuild: Double, decreasePct: Double)

  def run(baseSize: Int = 8000, ratios: Seq[Double] = Seq(0.25, 0.5, 0.75, 1.0),
          k: Int = 10, nQueries: Int = 100, pairs: Int = 10000,
          seed: Long = 149): Seq[Row] = {
    val p = SetGen.kosarakLite.copy(nSets = baseSize)
    val db = SetGen.local(p)
    val queries = Harness.sampleQueries(db, nQueries).toSeq
    val nGroups = Harness.defaultGroups(baseSize)
    val base = Harness.buildLes3(db, p.nTokens, nGroups, pairs, restarts = 2)
    val maxInserts = (ratios.max * baseSize).toInt
    val closedPool = SetGen.closedUpdates(p, maxInserts)
    // Previously-unseen tokens are mostly unique in practice (new users,
    // new words): draw them from a pool far larger than the insert batch
    // so few new tokens repeat across sets.
    val openPool = SetGen.openUpdates(p, maxInserts, 8 * maxInserts)

    def scenario(universe: String, pool: Array[Array[Int]]): Seq[Row] =
      ratios.map { ratio =>
        val inserts = pool.take((ratio * baseSize).toInt)
        // (a) incremental: clone the base index and apply §6 insertions.
        val incremental = new Les3Index(db, base.l2p.grouping)
        inserts.foreach(incremental.insert)
        val peInsert = Harness.meanPeKnn(incremental, queries, k)
        // (b) re-build: L2P from scratch over D ∪ D', with the same group
        // count as the incremental index so only the *partitioning* differs.
        val enlarged: Array[Array[Int]] = db ++ inserts
        val nTok = math.max(p.nTokens, enlarged.iterator.flatMap(_.iterator).foldLeft(-1)(math.max) + 1)
        val rebuilt = Harness.buildLes3(enlarged, nTok, nGroups, pairs, restarts = 2)
        val peRebuild = Harness.meanPeKnn(rebuilt.index, queries, k)
        Row(universe, ratio, peInsert, peRebuild,
            (peRebuild - peInsert) / peRebuild * 100.0)
      }

    scenario("closed", closedPool) ++ scenario("open", openPool)
  }

  def render(rows: Seq[Row]): String =
    Fmt.table("Fig 15: PE decrease under insertions vs re-build (kNN k=10)",
      Seq("universe", "insert ratio", "PE insert", "PE rebuild", "decrease %"),
      rows.map(r => Seq(r.universe, r.insertRatio.toString, Fmt.pct(r.peInsert),
                        Fmt.pct(r.peRebuild), f"${r.decreasePct}%.2f")))
}
