package repro.exp

import repro.core.{Grouping, Les3Index}
import repro.data.SetGen
import repro.embed.PTREmbedder
import repro.partition._

import scala.util.Random

/** Fig. 9 — L2P vs the algorithmic partitioners (§4.3) on a KOSARAK-lite
  * sample: partitioning time, partitioning working-space, and kNN (k=10)
  * latency of the LES³ index built from each partitioning.
  *
  * Space accounting follows the paper's argument (§7.4): L2P needs the
  * model parameters plus one mini-batch; PAR-G materializes the kNN graph;
  * PAR-C/D/A keep full membership structures and sampled-φ state.
  */
object Fig9Exp {

  final case class Row(method: String, partitionMs: Double, spaceBytes: Long,
                       knnMs: Double, peKnn: Double, gpoSampled: Double)

  def run(sampleSize: Int = 10000, nGroups: Int = 32, k: Int = 10,
          nQueries: Int = 100, pairs: Int = 10000, seed: Long = 137): Seq[Row] = {
    val p = SetGen.kosarakLite
    val full = SetGen.local(p)
    val rnd = new Random(seed)
    val db: Array[Array[Int]] = Array.fill(sampleSize)(full(rnd.nextInt(full.length)))
    val queries = Harness.sampleQueries(db, nQueries)

    def evaluate(name: String, spaceBytes: Long, ms: Double, g: Grouping): Row = {
      val index = new Les3Index(db, g)
      val knnMs = Harness.avgMs(queries.toSeq)(q => index.knn(q, k))
      val pe = Harness.meanPeKnn(index, queries.toSeq.take(50), k)
      Row(name, ms, spaceBytes, knnMs, pe, Grouping.gpoSampled(db, g, 32))
    }

    // --- L2P --- (single-restart training: this figure measures the raw
    // partitioning cost of one cascade pass, the paper's configuration)
    val cfg = L2P.Config(targetGroups = nGroups, initGroups = 4, minGroupSize = 50,
      siamese = Harness.paperSiamese(pairs, restarts = 1))
    val (l2p, l2pMs) = Harness.timeMs(L2P.partition(db, new PTREmbedder(p.nTokens), cfg))
    val dim = new PTREmbedder(p.nTokens).dim
    // dim→8→8→1 MLP: weights + biases per layer
    val paramsPerModel = (dim * 8 + 8) + (8 * 8 + 8) + (8 + 1)
    val l2pSpace = l2p.modelsTrained.toLong * paramsPerModel * 8 +
      cfg.siamese.batchSize.toLong * dim * 8 * 2
    val l2pRow = evaluate("L2P", l2pSpace, l2pMs, l2p.grouping)

    // --- PAR-G: kNN graph (built with the LES³ index, as in §7.4) + cut ---
    val (parg, pargMs) = Harness.timeMs {
      val accel = new Les3Index(db, l2p.grouping)
      ParG.partitionForKnn(db, nGroups, k,
        sid => accel.knn(db(sid), k + 1).hits.iterator.map(_.sid).filter(_ != sid).take(k).toArray)
    }
    val edges = db.length.toLong * k // directed edges materialized
    val pargSpace = edges * 2 * 4 + db.length.toLong * 16

    // --- PAR-C / PAR-D / PAR-A ---
    val (parc, parcMs) = Harness.timeMs(ParC.partition(db, nGroups))
    val parcSpace = db.length.toLong * 12
    val (pard, pardMs) = Harness.timeMs(ParD.partition(db, nGroups))
    val pardSpace = db.length.toLong * 12
    val (para, paraMs) = Harness.timeMs(ParA.partition(db, nGroups))
    val paraSpace = db.length.toLong * 20

    Seq(
      l2pRow,
      evaluate("PAR-G", pargSpace, pargMs, parg),
      evaluate("PAR-C", parcSpace, parcMs, parc),
      evaluate("PAR-D", pardSpace, pardMs, pard),
      evaluate("PAR-A", paraSpace, paraMs, para),
    )
  }

  def render(rows: Seq[Row]): String =
    Fmt.table("Fig 9: partitioning methods on sampled KOSARAK-lite",
      Seq("method", "partition ms", "space KB", "kNN ms", "PE(kNN)", "GPO (sampled)"),
      rows.map(r => Seq(r.method, Fmt.ms(r.partitionMs), Fmt.kb(r.spaceBytes),
                        Fmt.ms(r.knnMs), Fmt.pct(r.peKnn), f"${r.gpoSampled}%.0f")))
}
