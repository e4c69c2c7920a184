package repro.partition.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SetOps
import repro.partition.ParG
import scala.util.Random

class GraphPartSpec extends AnyFunSuite {

  test("KnnGraph.fromKnn produces a symmetric, deduplicated graph") {
    val nbrs: Map[Int, Array[Int]] = Map(
      0 -> Array(1, 2), 1 -> Array(0), 2 -> Array(0, 0), 3 -> Array(3))
    val adj = KnnGraph.fromKnn(4, nbrs(_))
    assert(adj(0).toSeq == Seq(1, 2))
    assert(adj(1).toSeq == Seq(0))
    assert(adj(2).toSeq == Seq(0))
    assert(adj(3).isEmpty) // self-loops dropped
    for (v <- 0 until 4; u <- adj(v)) assert(adj(u).contains(v), s"asymmetry $v-$u")
  }

  test("KnnGraph.fromThreshold links exactly the pairs above delta") {
    val db: Array[Array[Int]] = Array(Array(1, 2), Array(1, 2, 3), Array(9))
    val adj = KnnGraph.fromThreshold(db, 0.5)
    assert(adj(0).toSeq == Seq(1))
    assert(adj(1).toSeq == Seq(0))
    assert(adj(2).isEmpty)
  }

  test("bisection produces the requested number of groups on a big-enough graph") {
    val rnd = new Random(1)
    val n = 200
    val adj = Array.tabulate(n)(v => Array.fill(4)(rnd.nextInt(n)).filter(_ != v).distinct)
    val g = RecursiveBisection.partition(adj, 8)
    assert(g.nGroups == 8)
    assert(g.nSets == n)
  }

  test("bisection is balanced within tolerance") {
    val rnd = new Random(2)
    val n = 256
    val adj = Array.tabulate(n)(v => Array.fill(4)(rnd.nextInt(n)).filter(_ != v).distinct)
    val g = RecursiveBisection.partition(adj, 4)
    assert(g.sizes.max <= (n / 4 * 1.4).toInt, s"sizes ${g.sizes.toSeq}")
    assert(g.sizes.min >= (n / 4 * 0.6).toInt)
  }

  test("bisection finds the natural cut of two disconnected cliques") {
    val n = 60
    def clique(lo: Int, hi: Int, v: Int): Array[Int] =
      Array.range(lo, hi).filter(_ != v)
    val adj = Array.tabulate(n)(v => if (v < 30) clique(0, 30, v) else clique(30, 60, v))
    val g = RecursiveBisection.partition(adj, 2)
    assert(RecursiveBisection.cutSize(adj, g) == 0)
    assert(g.sizes.toSeq.sorted == Seq(30, 30))
  }

  test("cutSize counts undirected crossing edges once") {
    val adj = Array(Array(1), Array(0, 2), Array(1))
    val g = new repro.core.Grouping(Array(0, 0, 1), 2)
    assert(RecursiveBisection.cutSize(adj, g) == 1)
  }

  test("refinement reduces the cut of a noisy two-cluster graph vs no refinement") {
    val rnd = new Random(3)
    val n = 200
    val adj = Array.tabulate(n) { v =>
      val cluster = if (v < 100) 0 else 100
      val intra = Array.fill(6)(cluster + rnd.nextInt(100))
      val inter = if (rnd.nextInt(10) == 0) Array((v + 100) % 200) else Array.empty[Int]
      (intra ++ inter).filter(_ != v).distinct
    }
    val refined = RecursiveBisection.partition(adj, 2, RecursiveBisection.Config(refinePasses = 6))
    val unrefined = RecursiveBisection.partition(adj, 2, RecursiveBisection.Config(refinePasses = 0))
    assert(RecursiveBisection.cutSize(adj, refined) <= RecursiveBisection.cutSize(adj, unrefined))
  }

  test("ParG end-to-end groups similar sets together") {
    val rnd = new Random(4)
    val db: Array[Array[Int]] = Array.tabulate(80) { i =>
      val base = (i % 4) * 100
      SetOps.canon(Seq.fill(5)(base + rnd.nextInt(25)))
    }
    val knnOf = (sid: Int) => db.indices
      .filter(_ != sid)
      .sortBy(j => -SetOps.jaccard(db(sid), db(j)))
      .take(5).toArray
    val g = ParG.partitionForKnn(db, 4, 5, knnOf)
    assert(g.nGroups == 4)
    // a majority of each cluster should share a group
    val clusterGroups = (0 until 4).map { c =>
      val members = db.indices.filter(_ % 4 == c).map(g.assignment)
      members.groupBy(identity).values.map(_.size).max.toDouble / members.size
    }
    assert(clusterGroups.forall(_ > 0.6), s"purity $clusterGroups")
  }

  test("ParG range variant builds from the threshold graph") {
    val db: Array[Array[Int]] = Array(Array(1, 2), Array(1, 2, 3), Array(50), Array(50, 51))
    val g = ParG.partitionForRange(db, 2, 0.4)
    assert(g.nGroups == 2)
    assert(g.assignment(0) == g.assignment(1))
    assert(g.assignment(2) == g.assignment(3))
  }
}
