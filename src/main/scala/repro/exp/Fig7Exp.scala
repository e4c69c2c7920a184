package repro.exp

import repro.core.SetOps
import repro.data.SetGen
import repro.ml.Siamese
import repro.partition.L2P
import repro.embed.PTREmbedder

/** Fig. 7 — model convergence (a: training loss per epoch of a level-0
  * model per dataset) and training cost (b: total L2P time vs number of
  * groups, which the paper reports growing linearly).
  */
object Fig7Exp {

  final case class CurveRow(dataset: String, lossPerEpoch: Seq[Double])
  final case class CostRow(nGroups: Int, modelsTrained: Int, trainMs: Double)

  /** (a): train one level-0 Siamese (first min-token chunk) with a longer
    * epoch budget so the convergence point is visible.
    */
  def learningCurves(profiles: Seq[SetGen.Profile], epochs: Int = 8,
                     chunkSize: Int = 2000, pairs: Int = 20000): Seq[CurveRow] =
    profiles.map { p =>
      val db = SetGen.local(p)
      val order = db.indices.sortBy(i => if (db(i).isEmpty) 0 else db(i).min)
      val chunk = order.take(math.min(chunkSize, db.length)).toArray
      val emb = new PTREmbedder(p.nTokens)
      val tr = Siamese.train(chunk, db, i => emb.embed(db(i)),
        SetOps.Jaccard,
        Siamese.Config(pairs = pairs, epochs = epochs, batchSize = 256, lr = 0.05))
      CurveRow(p.name, tr.lossPerEpoch.toSeq)
    }

  /** (b): full cascade training cost for increasing target group counts. */
  def trainingCost(p: SetGen.Profile, targets: Seq[Int] = Seq(16, 32, 64, 128),
                   pairs: Int = 10000): Seq[CostRow] = {
    val db = SetGen.local(p)
    targets.map { n =>
      val (res, ms) = Harness.timeMs {
        L2P.partition(db, new PTREmbedder(p.nTokens), Harness.l2pConfig(db.length, n, pairs))
      }
      CostRow(n, res.modelsTrained, ms)
    }
  }

  def renderCurves(rows: Seq[CurveRow]): String =
    Fmt.table("Fig 7(a): training loss per epoch (level-0 model)",
      Seq("dataset") ++ rows.head.lossPerEpoch.indices.map(e => s"epoch${e + 1}"),
      rows.map(r => r.dataset +: r.lossPerEpoch.map(l => f"$l%.5f")))

  def renderCost(rows: Seq[CostRow]): String =
    Fmt.table("Fig 7(b): L2P training cost vs number of groups",
      Seq("nGroups", "models", "train ms"),
      rows.map(r => Seq(r.nGroups.toString, r.modelsTrained.toString, Fmt.ms(r.trainMs))))
}
