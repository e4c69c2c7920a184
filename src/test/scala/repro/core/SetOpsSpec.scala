package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SetOpsSpec extends AnyFunSuite {

  private def naiveJaccard(a: Set[Int], b: Set[Int]): Double =
    if (a.isEmpty && b.isEmpty) 1.0 else a.intersect(b).size.toDouble / a.union(b).size

  test("canon sorts and deduplicates") {
    assert(SetOps.canon(Seq(3, 1, 2, 3, 1)).toSeq == Seq(1, 2, 3))
  }

  test("canon of empty input is empty") {
    assert(SetOps.canon(Seq.empty).isEmpty)
  }

  test("intersectSize on disjoint arrays is 0") {
    assert(SetOps.intersectSize(Array(1, 3, 5), Array(2, 4, 6)) == 0)
  }

  test("intersectSize on identical arrays is the length") {
    assert(SetOps.intersectSize(Array(1, 2, 3), Array(1, 2, 3)) == 3)
  }

  test("intersectSize with empty array is 0") {
    assert(SetOps.intersectSize(Array.empty[Int], Array(1, 2)) == 0)
  }

  test("jaccard of identical sets is 1") {
    assert(SetOps.jaccard(Array(1, 2, 3), Array(1, 2, 3)) == 1.0)
  }

  test("jaccard of disjoint sets is 0") {
    assert(SetOps.jaccard(Array(1), Array(2)) == 0.0)
  }

  test("jaccard empty-vs-empty is 1, empty-vs-nonempty is 0") {
    assert(SetOps.jaccard(Array.empty[Int], Array.empty[Int]) == 1.0)
    assert(SetOps.jaccard(Array.empty[Int], Array(1)) == 0.0)
  }

  test("jaccard hand example") {
    // {1,2,3} vs {2,3,4}: inter 2, union 4
    assert(SetOps.jaccard(Array(1, 2, 3), Array(2, 3, 4)) == 0.5)
  }

  test("jaccard matches naive set implementation on random inputs") {
    val rnd = new Random(1)
    for (_ <- 1 to 200) {
      val a = SetOps.canon(Seq.fill(rnd.nextInt(20))(rnd.nextInt(30)))
      val b = SetOps.canon(Seq.fill(rnd.nextInt(20))(rnd.nextInt(30)))
      assert(math.abs(SetOps.jaccard(a, b) - naiveJaccard(a.toSet, b.toSet)) < 1e-12)
    }
  }

  test("dice hand example and bounds") {
    // 2·2/(3+3)
    assert(math.abs(SetOps.dice(Array(1, 2, 3), Array(2, 3, 4)) - 2.0 / 3) < 1e-12)
    val rnd = new Random(2)
    for (_ <- 1 to 100) {
      val a = SetOps.canon(Seq.fill(rnd.nextInt(10) + 1)(rnd.nextInt(20)))
      val b = SetOps.canon(Seq.fill(rnd.nextInt(10) + 1)(rnd.nextInt(20)))
      val d = SetOps.dice(a, b)
      assert(d >= 0.0 && d <= 1.0)
    }
  }

  test("cosine hand example from the paper (Sec 3.2)") {
    // Q={t1,t2,t3}, R={t1,t2}: 2/sqrt(3*2) ≈ 0.816
    val v = SetOps.cosine(Array(1, 2, 3), Array(1, 2))
    assert(math.abs(v - 2.0 / math.sqrt(6)) < 1e-12)
  }

  test("all measures are symmetric") {
    val rnd = new Random(3)
    for (m <- Seq(SetOps.Jaccard, SetOps.Cosine, SetOps.Dice); _ <- 1 to 50) {
      val a = SetOps.canon(Seq.fill(rnd.nextInt(15))(rnd.nextInt(25)))
      val b = SetOps.canon(Seq.fill(rnd.nextInt(15))(rnd.nextInt(25)))
      assert(math.abs(m.sim(a, b) - m.sim(b, a)) < 1e-12)
    }
  }

  test("ubFromOverlap is the similarity of Q with its matched subset (tightness)") {
    val rnd = new Random(4)
    for (m <- Seq(SetOps.Jaccard, SetOps.Cosine, SetOps.Dice); _ <- 1 to 50) {
      val q = SetOps.canon(Seq.fill(rnd.nextInt(12) + 1)(rnd.nextInt(40)))
      val keep = q.filter(_ => rnd.nextBoolean())
      // Sim(Q, R) where R ⊆ Q with |R| = matched
      assert(math.abs(m.ubFromOverlap(keep.length, q.length) - m.sim(q, keep)) < 1e-12
        || keep.isEmpty) // empty R: cosine defines 0, ubFromOverlap(0, n) = 0
      if (keep.isEmpty) assert(m.ubFromOverlap(0, q.length) == 0.0)
    }
  }

  test("ubFromOverlap is monotone in the matched count") {
    for (m <- Seq(SetOps.Jaccard, SetOps.Cosine, SetOps.Dice); q <- Seq(1, 5, 10)) {
      val ubs = (0 to q).map(m.ubFromOverlap(_, q))
      assert(ubs == ubs.sorted)
      assert(ubs.last == 1.0)
    }
  }
}
