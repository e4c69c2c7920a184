package repro.partition

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Grouping, SetOps}
import scala.util.Random

/** PAR-C / PAR-D / PAR-A (§4.3): shape invariants plus GPO quality vs a
  * random partitioning on cluster-structured data.
  */
class PartitionersSpec extends AnyFunSuite {

  /** `k` disjoint-token clusters of `per` sets each. */
  private def clustered(k: Int, per: Int, seed: Long): Array[Array[Int]] = {
    val rnd = new Random(seed)
    Array.tabulate(k * per) { i =>
      val base = (i % k) * 100
      SetOps.canon(Seq.fill(6)(base + rnd.nextInt(30)))
    }
  }

  private def gpo(db: Array[Array[Int]], g: Grouping): Double = Grouping.gpoExact(db, g)

  for ((name, partition) <- Seq[(String, (Array[Array[Int]], Int) => Grouping)](
    "PAR-C" -> ((db, n) => ParC.partition(db, n)),
    "PAR-D" -> ((db, n) => ParD.partition(db, n)),
    "PAR-A" -> ((db, n) => ParA.partition(db, n)),
  )) {

    test(s"$name assigns every set to a valid group") {
      val db = clustered(4, 30, 1)
      val g = partition(db, 4)
      assert(g.nSets == db.length)
      assert(g.assignment.forall(a => a >= 0 && a < g.nGroups))
    }

    test(s"$name produces (at most) the requested number of non-trivial groups") {
      val db = clustered(4, 30, 2)
      val g = partition(db, 4)
      assert(g.nGroups <= 5) // PAR-D may keep exactly n; others exactly n
      assert(g.sizes.count(_ > 0) >= 2)
    }

    test(s"$name beats a random partitioning on GPO for clustered data") {
      val db = clustered(4, 25, 3)
      val g = partition(db, 4)
      val rand = Grouping.random(db.length, 4, 99)
      assert(gpo(db, g) < gpo(db, rand), s"$name gpo=${gpo(db, g)} random=${gpo(db, rand)}")
    }

    test(s"$name is deterministic for fixed seeds") {
      val db = clustered(3, 20, 4)
      assert(partition(db, 3).assignment.toSeq == partition(db, 3).assignment.toSeq)
    }
  }

  test("PAR-C recovers perfectly-separable clusters nearly optimally") {
    val db = clustered(3, 20, 5)
    val g = ParC.partition(db, 3, ParC.Config(maxPasses = 8))
    // intra-cluster distance < 1, inter = 1: optimal GPO groups by cluster
    val opt = new Grouping(Array.tabulate(60)(_ % 3), 3)
    assert(gpo(db, g) <= gpo(db, opt) * 1.6)
  }

  test("PAR-A merge bookkeeping: merging to one group puts everything together") {
    val db = clustered(2, 10, 6)
    val g = ParA.partition(db, 1)
    assert(g.nGroups == 1)
    assert(g.sizes(0) == 20)
  }

  test("PAR-D stops splitting singleton groups") {
    val db: Array[Array[Int]] = Array(Array(1), Array(2), Array(3))
    val g = ParD.partition(db, 10)
    assert(g.nGroups <= 3 + 1)
    assert(g.nSets == 3)
  }
}
