package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class TGMSpec extends AnyFunSuite {

  // The paper's Figure 1 example: T = {A,B,C,D} → {0,1,2,3}, six sets in
  // two groups.
  private val figure1Db: Array[Array[Int]] = Array(
    Array(0),       // {A}   -> G0
    Array(0, 1),    // {A,B} -> G0
    Array(1),       // {B}   -> G0
    Array(2),       // {C}   -> G1
    Array(2, 3),    // {C,D} -> G1
    Array(3),       // {D}   -> G1
  )
  private val figure1Grouping = new Grouping(Array(0, 0, 0, 1, 1, 1), 2)

  test("Figure 1: matrix entries match Eq. 1") {
    val tgm = TGM.build(figure1Db, figure1Grouping)
    // G0 contains tokens A,B only; G1 contains C,D only
    assert(tgm.matched(Array(0), 0) == 1)
    assert(tgm.matched(Array(1), 0) == 1)
    assert(tgm.matched(Array(2), 0) == 0)
    assert(tgm.matched(Array(3), 0) == 0)
    assert(tgm.matched(Array(2), 1) == 1)
    assert(tgm.matched(Array(0), 1) == 0)
  }

  test("Figure 1: UB({A}, G0) = 1 and UB({A}, G1) = 0 (paper Sec 3.1)") {
    val tgm = TGM.build(figure1Db, figure1Grouping)
    assert(tgm.ub(Array(0), 0) == 1.0)
    assert(tgm.ub(Array(0), 1) == 0.0)
  }

  test("group sizes recorded") {
    val tgm = TGM.build(figure1Db, figure1Grouping)
    assert(tgm.groupSizes.toSeq == Seq(3, 3))
  }

  test("out-of-universe query tokens contribute 0 (Sec 3.1)") {
    val tgm = TGM.build(figure1Db, figure1Grouping)
    assert(tgm.matched(Array(0, 99), 0) == 1)
    assert(tgm.ub(Array(99), 0) == 0.0)
  }

  test("UB upper-bounds the similarity of every member (Thm 3.1, Jaccard)") {
    val rnd = new Random(31)
    for (_ <- 1 to 20) {
      val db: Array[Array[Int]] =
        Array.fill(80)(SetOps.canon(Seq.fill(rnd.nextInt(10) + 1)(rnd.nextInt(60))))
      val g = Grouping.random(80, 8, rnd.nextLong())
      val tgm = TGM.build(db, g)
      val q = SetOps.canon(Seq.fill(rnd.nextInt(10) + 1)(rnd.nextInt(60)))
      for (grp <- 0 until 8; sid <- g.members(grp)) {
        assert(tgm.ub(q, grp) + 1e-12 >= SetOps.jaccard(q, db(sid)),
          s"UB violated for group $grp set $sid")
      }
    }
  }

  test("UB upper-bounds member similarity for cosine and dice too") {
    val rnd = new Random(32)
    for (m <- Seq(SetOps.Cosine, SetOps.Dice)) {
      val db: Array[Array[Int]] =
        Array.fill(60)(SetOps.canon(Seq.fill(rnd.nextInt(8) + 1)(rnd.nextInt(40))))
      val g = Grouping.random(60, 6, 77)
      val tgm = TGM.build(db, g, m)
      for (_ <- 1 to 10) {
        val q = SetOps.canon(Seq.fill(rnd.nextInt(8) + 1)(rnd.nextInt(40)))
        for (grp <- 0 until 6; sid <- g.members(grp)) {
          assert(tgm.ub(q, grp) + 1e-12 >= m.sim(q, db(sid)))
        }
      }
    }
  }

  test("UB is tight when a member equals the matched token set") {
    // G0 = {{1,2}}, query {1,2,3}: R = {1,2}, and the set IS R.
    val db: Array[Array[Int]] = Array(Array(1, 2))
    val tgm = TGM.build(db, new Grouping(Array(0), 1))
    val q = Array(1, 2, 3)
    assert(tgm.ub(q, 0) == SetOps.jaccard(q, db(0)))
  }

  test("addSet extends the token universe") {
    val tgm = new TGM()
    tgm.addGroup()
    tgm.addSet(0, Array(5))
    assert(tgm.nTokens == 6)
    tgm.addSet(0, Array(100))
    assert(tgm.nTokens == 101)
    assert(tgm.matched(Array(5, 100), 0) == 2)
    assert(tgm.groupSize(0) == 2)
  }

  test("addTokensOnly does not change group size; setSize does") {
    val tgm = new TGM()
    tgm.addGroup()
    tgm.addTokensOnly(0, Seq(1, 2, 3))
    assert(tgm.groupSize(0) == 0)
    assert(tgm.matched(Array(1, 2, 3), 0) == 3)
    tgm.setSize(0, 7)
    assert(tgm.groupSize(0) == 7)
  }

  test("sizeBytes positive and grows with content") {
    val tgm = TGM.build(figure1Db, figure1Grouping)
    val before = tgm.sizeBytes
    assert(before > 0)
    tgm.addSet(0, Array(500, 600, 700))
    assert(tgm.sizeBytes > before)
  }

  test("groupTokenCount equals |GS_g|") {
    val tgm = TGM.build(figure1Db, figure1Grouping)
    assert(tgm.groupTokenCount(0) == 2)
    assert(tgm.groupTokenCount(1) == 2)
  }

  test("bulk build equals incremental build") {
    val rnd = new Random(33)
    val db: Array[Array[Int]] =
      Array.fill(40)(SetOps.canon(Seq.fill(rnd.nextInt(6) + 1)(rnd.nextInt(30))))
    val g = Grouping.random(40, 4, 9)
    val bulk = TGM.build(db, g)
    val inc = new TGM()
    (0 until 4).foreach(_ => inc.addGroup())
    for (sid <- db.indices) inc.addSet(g.assignment(sid), db(sid))
    val q = SetOps.canon(Seq.fill(10)(rnd.nextInt(30)))
    for (grp <- 0 until 4) {
      assert(bulk.matched(q, grp) == inc.matched(q, grp))
      assert(bulk.groupSize(grp) == inc.groupSize(grp))
    }
  }
}
