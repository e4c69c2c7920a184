package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig9Exp

/** Fig. 9 — L2P vs PAR-G / PAR-C / PAR-D / PAR-A. */
class Fig9PartitionerBench extends AnyFunSuite {

  test("Fig 9: L2P is cheapest to run and at least as effective") {
    val rows = Fig9Exp.run()
    println(Fig9Exp.render(rows))
    val byName = rows.map(r => r.method -> r).toMap
    val l2p = byName("L2P")
    // paper: L2P saves ~80% partitioning time and ~99% space vs PAR-G
    assert(l2p.partitionMs < byName("PAR-G").partitionMs,
      s"L2P ${l2p.partitionMs}ms vs PAR-G ${byName("PAR-G").partitionMs}ms")
    assert(l2p.spaceBytes < byName("PAR-G").spaceBytes)
    // paper: the algorithmic methods suffer local optimality; L2P's PE is
    // at least competitive with every one of them
    val others = Seq("PAR-G", "PAR-C", "PAR-D", "PAR-A").map(byName(_))
    assert(l2p.peKnn + 0.08 >= others.map(_.peKnn).max,
      s"L2P PE ${l2p.peKnn} vs others ${others.map(o => o.method -> o.peKnn)}")
    // PAR-A (bottom-up from singletons) is the costliest, as in the paper
    assert(byName("PAR-A").partitionMs > l2p.partitionMs)
  }
}
