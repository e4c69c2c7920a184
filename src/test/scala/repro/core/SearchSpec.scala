package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.BruteForce
import repro.io.IOModel
import scala.util.Random

class SearchSpec extends AnyFunSuite {

  private def randomDb(n: Int, nTokens: Int, maxSize: Int, seed: Long): Array[Array[Int]] = {
    val rnd = new Random(seed)
    Array.fill(n)(SetOps.canon(Seq.fill(rnd.nextInt(maxSize) + 1)(rnd.nextInt(nTokens))))
  }

  test("range returns exactly the brute-force result, many random instances") {
    val rnd = new Random(41)
    for (trial <- 1 to 15) {
      val db = randomDb(120, 50, 8, rnd.nextLong())
      val index = new Les3Index(db, Grouping.random(db.length, 10, rnd.nextLong()))
      val brute = new BruteForce(db)
      for (delta <- Seq(0.3, 0.5, 0.8, 1.0)) {
        val q = db(rnd.nextInt(db.length))
        val got = index.range(q, delta).hits.map(h => (h.sid, h.sim)).sortBy(_._1)
        val exp = brute.range(q, delta).hits.map(h => (h.sid, h.sim)).sortBy(_._1)
        assert(got == exp, s"trial $trial delta $delta")
      }
    }
  }

  test("knn similarity profile matches brute force, many random instances") {
    val rnd = new Random(42)
    for (trial <- 1 to 15) {
      val db = randomDb(150, 60, 10, rnd.nextLong())
      val index = new Les3Index(db, Grouping.random(db.length, 12, rnd.nextLong()))
      val brute = new BruteForce(db)
      for (k <- Seq(1, 5, 20)) {
        val q = db(rnd.nextInt(db.length))
        val got = index.knn(q, k).hits.map(_.sim).sorted
        val exp = brute.knn(q, k).hits.map(_.sim).sorted
        assert(got == exp, s"trial $trial k $k")
      }
    }
  }

  test("knn returns at most k hits and in descending order") {
    val db = randomDb(50, 30, 6, 5)
    val index = new Les3Index(db, Grouping.random(db.length, 5, 1))
    val r = index.knn(db(0), 7)
    assert(r.hits.length == 7)
    assert(r.hits.map(_.sim).toSeq == r.hits.map(_.sim).sortBy(-_).toSeq)
  }

  test("knn with k larger than |D| returns everything") {
    val db = randomDb(10, 20, 5, 6)
    val index = new Les3Index(db, Grouping.random(db.length, 3, 2))
    assert(index.knn(db(0), 50).hits.length == 10)
  }

  test("range at delta above 1 returns nothing; at 0 returns everything") {
    val db = randomDb(30, 20, 5, 7)
    val index = new Les3Index(db, Grouping.random(db.length, 4, 3))
    assert(index.range(db(0), 1.01).hits.isEmpty)
    assert(index.range(db(0), 0.0).hits.length == 30)
  }

  test("query for an indexed set always finds it with similarity 1") {
    val db = randomDb(80, 40, 6, 8)
    val index = new Les3Index(db, Grouping.random(db.length, 8, 4))
    for (sid <- Seq(0, 17, 79)) {
      val r = index.range(db(sid), 1.0)
      assert(r.hits.exists(h => h.sim == 1.0))
      assert(index.knn(db(sid), 1).hits.head.sim == 1.0)
    }
  }

  test("candidates never exceed |D| and PE is in [0, 1] for kNN") {
    val db = randomDb(100, 50, 8, 9)
    val index = new Les3Index(db, Grouping.random(db.length, 10, 5))
    for (k <- Seq(1, 10)) {
      val s = index.knn(db(3), k).stats
      assert(s.candidates <= db.length)
      val pe = s.peKnn(db.length, k)
      assert(pe >= 0.0 && pe <= 1.0)
    }
  }

  test("good partitioning yields higher PE than one-group partitioning") {
    // One group = zero pruning (everything is a candidate).
    val db = randomDb(100, 200, 5, 10)
    val oneGroup = new Les3Index(db, new Grouping(Array.fill(100)(0), 1))
    val s = oneGroup.knn(db(0), 5).stats
    assert(s.candidates == 100)
    assert(math.abs(s.peKnn(100, 5) - 0.05) < 1e-9)
  }

  test("in-memory IO model reports zero storage time") {
    val db = randomDb(40, 30, 5, 11)
    val index = new Les3Index(db, Grouping.random(db.length, 4, 6))
    assert(index.range(db(0), 0.5).stats.ioMs == 0.0)
    assert(index.knn(db(0), 3).stats.ioMs == 0.0)
  }

  test("HDD IO model accumulates per-group random access time") {
    val db = randomDb(40, 30, 5, 12)
    val index = new Les3Index(db, Grouping.random(db.length, 4, 6), io = IOModel.Hdd())
    val s = index.range(db(0), 0.2).stats
    assert(s.groupsRead > 0)
    assert(s.ioMs >= s.groupsRead * 11.0) // ≥ seek+rotational per group
  }

  test("insert: joins the group with the highest UB (Sec 6)") {
    // G0 holds token 1..2 sets, G1 holds token 10..11 sets.
    val db: Array[Array[Int]] = Array(Array(1, 2), Array(1), Array(10, 11), Array(10))
    val index = new Les3Index(db, new Grouping(Array(0, 0, 1, 1), 2))
    val (sid, gid) = index.insert(Array(1, 2))
    assert(sid == 4)
    assert(gid == 0)
    val (_, gid2) = index.insert(Array(10, 11))
    assert(gid2 == 1)
  }

  test("insert: UB ties go to the smallest group") {
    val db: Array[Array[Int]] = Array(Array(1), Array(1), Array(1), Array(1), Array(1))
    // G0 has 4 sets, G1 has 1; both contain token 1 → tie on UB.
    val index = new Les3Index(db, new Grouping(Array(0, 0, 0, 0, 1), 2))
    val (_, gid) = index.insert(Array(1))
    assert(gid == 1)
  }

  test("insert: set with only unseen tokens goes to the smallest group") {
    val db: Array[Array[Int]] = Array(Array(1), Array(1), Array(2))
    val index = new Les3Index(db, new Grouping(Array(0, 0, 1), 2))
    val (_, gid) = index.insert(Array(500, 600))
    assert(gid == 1)
    assert(index.tgm.nTokens == 601)
  }

  test("search stays exact after open-universe insertions (Sec 6)") {
    val rnd = new Random(43)
    val db = randomDb(60, 30, 6, 13)
    val index = new Les3Index(db, Grouping.random(db.length, 6, 7))
    for (i <- 1 to 30) {
      val s = SetOps.canon(Seq.fill(rnd.nextInt(6) + 1)(rnd.nextInt(60))) // half new tokens
      index.insert(s)
    }
    val allDb = index.db.toArray
    val brute = new BruteForce(allDb)
    for (_ <- 1 to 10) {
      val q = allDb(rnd.nextInt(allDb.length))
      val got = index.range(q, 0.5).hits.map(h => (h.sid, h.sim)).sortBy(_._1)
      val exp = brute.range(q, 0.5).hits.map(h => (h.sid, h.sim)).sortBy(_._1)
      assert(got == exp)
      assert(index.knn(q, 5).hits.map(_.sim).sorted == brute.knn(q, 5).hits.map(_.sim).sorted)
    }
  }

  test("range PE accounts for result size (Definition 2.3)") {
    val db: Array[Array[Int]] = Array(Array(1), Array(1), Array(2), Array(3))
    val index = new Les3Index(db, new Grouping(Array(0, 0, 1, 2), 3))
    val r = index.range(Array(1), 1.0)
    // only group 0 verified: candidates=2, results=2 → PE = (4-(2-2))/4 = 1
    assert(r.stats.candidates == 2)
    assert(r.stats.peRange(4, r.hits.length) == 1.0)
  }
}
