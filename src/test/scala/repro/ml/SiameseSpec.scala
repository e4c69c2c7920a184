package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SetOps
import repro.embed.PTREmbedder
import scala.util.Random

class SiameseSpec extends AnyFunSuite {

  /** Two clearly-separated token clusters: small per-cluster pools give
    * high intra-cluster similarity vs zero inter-cluster similarity, so
    * the surrogate loss (which weights pairs by dissimilarity) has a
    * strong signal.
    */
  private def twoClusters(n: Int, seed: Long): Array[Array[Int]] = {
    val rnd = new Random(seed)
    Array.tabulate(n) { i =>
      val base = if (i % 2 == 0) 0 else 64
      SetOps.canon(Seq.fill(6)(base + rnd.nextInt(9)))
    }
  }

  private def trainOn(db: Array[Array[Int]], cfg: Siamese.Config): Siamese.TrainResult = {
    val emb = new PTREmbedder(128)
    val reps = db.map(emb.embed)
    Siamese.train(db.indices.toArray, db, reps(_), SetOps.Jaccard, cfg)
  }

  test("training loss decreases over epochs on separable data") {
    val db = twoClusters(300, 1)
    val tr = trainOn(db, Siamese.Config(pairs = 4000, epochs = 6, lr = 0.05, seed = 2))
    assert(tr.lossPerEpoch.last < tr.lossPerEpoch.head,
      s"losses ${tr.lossPerEpoch.toSeq}")
  }

  test("a trained model separates two disjoint-token clusters") {
    // The surrogate training is a local search (§5.1); with restart-based
    // model selection the split should be strongly cluster-aligned, though
    // not always perfect — assert a strong majority plus a GPO advantage
    // over a random balanced split.
    val db = twoClusters(400, 3)
    val emb = new PTREmbedder(128)
    val tr = trainOn(db, Siamese.Config(pairs = 8000, epochs = 5, lr = 0.05,
      restarts = 5, seed = 4))
    val sides = db.map(s => tr.model.side(emb.embed(s)))
    val evenSides = sides.zipWithIndex.filter(_._2 % 2 == 0).map(_._1)
    val oddSides = sides.zipWithIndex.filter(_._2 % 2 == 1).map(_._1)
    val evenMaj = if (evenSides.count(_ == 0) * 2 >= evenSides.length) 0 else 1
    val oddMaj = if (oddSides.count(_ == 0) * 2 >= oddSides.length) 0 else 1
    assert(evenMaj != oddMaj, "clusters collapsed to the same side")
    val accuracy = (evenSides.count(_ == evenMaj) + oddSides.count(_ == oddMaj)).toDouble / db.length
    assert(accuracy > 0.8, s"separation accuracy $accuracy")

    val learned = new repro.core.Grouping(sides, 2)
    val rnd = new Random(99)
    val randomSplit = new repro.core.Grouping(db.map(_ => rnd.nextInt(2)), 2)
    assert(repro.core.Grouping.gpoExact(db, learned) <
           repro.core.Grouping.gpoExact(db, randomSplit))
  }

  test("both sides are non-empty after training (threshold fallback)") {
    val rnd = new Random(5)
    val db: Array[Array[Int]] =
      Array.fill(120)(SetOps.canon(Seq.fill(4)(rnd.nextInt(100))))
    val emb = new PTREmbedder(128)
    val tr = trainOn(db, Siamese.Config(pairs = 1000, epochs = 2, seed = 6))
    val sides = db.map(s => tr.model.side(emb.embed(s)))
    assert(sides.contains(0) && sides.contains(1))
  }

  test("training is deterministic in the seed") {
    val db = twoClusters(100, 7)
    val a = trainOn(db, Siamese.Config(pairs = 1000, epochs = 2, seed = 8))
    val b = trainOn(db, Siamese.Config(pairs = 1000, epochs = 2, seed = 8))
    assert(a.lossPerEpoch.toSeq == b.lossPerEpoch.toSeq)
    assert(a.model.net.params.map(_.toSeq).toSeq == b.model.net.params.map(_.toSeq).toSeq)
  }

  test("pair cap respects small groups") {
    val db = twoClusters(4, 9)
    // 4 sets → at most 4·4·4 = 64 pairs sampled; must not loop forever
    val tr = trainOn(db, Siamese.Config(pairs = 100000, epochs = 1, seed = 10))
    assert(tr.lossPerEpoch.length == 1)
  }

  test("bisecting fewer than two sets is rejected") {
    val db: Array[Array[Int]] = Array(Array(1))
    val emb = new PTREmbedder(16)
    intercept[IllegalArgumentException] {
      Siamese.train(Array(0), db, i => emb.embed(db(i)), SetOps.Jaccard, Siamese.Config())
    }
  }

  test("surrogate loss is recorded per epoch") {
    val db = twoClusters(60, 11)
    val tr = trainOn(db, Siamese.Config(pairs = 500, epochs = 4, seed = 12))
    assert(tr.lossPerEpoch.length == 4)
    assert(tr.lossPerEpoch.forall(_ >= 0.0))
  }
}
