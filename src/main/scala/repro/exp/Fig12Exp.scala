package repro.exp

import repro.baselines.{BruteForce, DualTrans, InvIdx}
import repro.core.Les3Index
import repro.data.SetGen
import repro.io.IOModel

/** Fig. 12 — memory-based comparison of LES³ vs DualTrans, InvIdx and
  * brute force for range queries (δ sweep) and kNN queries (k sweep).
  */
object Fig12Exp {

  final case class Row(dataset: String, method: String, query: String,
                       param: Double, cpuMs: Double, ioMs: Double)

  /** All four engines over one database under one [[IOModel]]. */
  final case class Engines(les3: Les3Index, dual: DualTrans, inv: InvIdx, brute: BruteForce)

  def buildEngines(db: Array[Array[Int]], nTokens: Int, nGroups: Int,
                   io: IOModel, pairs: Int = 20000, restarts: Int = 3): Engines = {
    val built = Harness.buildLes3(db, nTokens, nGroups, pairs, io, restarts)
    Engines(built.index, new DualTrans(db, 16, io), new InvIdx(db, io), new BruteForce(db, io = io))
  }

  /** Sweep both query types over all engines; also asserts that all four
    * methods return identical result similarities on the first few queries
    * (exactness cross-check).
    */
  def sweep(dataset: String, engines: Engines, queries: Seq[Array[Int]],
            deltas: Seq[Double], ks: Seq[Int]): Seq[Row] = {
    crossCheck(engines, queries.take(5))
    val e = engines
    val rangeRows = deltas.flatMap { d =>
      Seq(
        measure(dataset, "LES3", "range", d, queries)(q => e.les3.range(q, d).stats.ioMs),
        measure(dataset, "DualTrans", "range", d, queries)(q => e.dual.range(q, d).stats.ioMs),
        measure(dataset, "InvIdx", "range", d, queries)(q => e.inv.range(q, d).stats.ioMs),
        measure(dataset, "BruteForce", "range", d, queries)(q => e.brute.range(q, d).stats.ioMs),
      )
    }
    val knnRows = ks.flatMap { k =>
      Seq(
        measure(dataset, "LES3", "knn", k, queries)(q => e.les3.knn(q, k).stats.ioMs),
        measure(dataset, "DualTrans", "knn", k, queries)(q => e.dual.knn(q, k).stats.ioMs),
        measure(dataset, "InvIdx", "knn", k, queries)(q => e.inv.knn(q, k).stats.ioMs),
        measure(dataset, "BruteForce", "knn", k, queries)(q => e.brute.knn(q, k).stats.ioMs),
      )
    }
    rangeRows ++ knnRows
  }

  private def measure(dataset: String, method: String, query: String, param: Double,
                      queries: Seq[Array[Int]])(run: Array[Int] => Double): Row = {
    var ioTotal = 0.0
    val t0 = System.nanoTime()
    queries.foreach(q => ioTotal += run(q))
    val cpu = (System.nanoTime() - t0) / 1e6 / queries.size
    Row(dataset, method, query, param, cpu, ioTotal / queries.size)
  }

  /** All methods must agree on range hits and on kNN similarity profiles. */
  def crossCheck(e: Engines, queries: Seq[Array[Int]], delta: Double = 0.6, k: Int = 10): Unit = {
    for (q <- queries) {
      val expected = e.brute.range(q, delta).hits.map(h => (h.sid, math.round(h.sim * 1e9))).sortBy(_._1)
      for ((name, got) <- Seq(
        "LES3" -> e.les3.range(q, delta),
        "DualTrans" -> e.dual.range(q, delta),
        "InvIdx" -> e.inv.range(q, delta))) {
        val gotNorm = got.hits.map(h => (h.sid, math.round(h.sim * 1e9))).sortBy(_._1)
        require(gotNorm == expected, s"$name range mismatch vs brute force")
      }
      val expKnn = e.brute.knn(q, k).hits.map(h => math.round(h.sim * 1e9)).sorted
      for ((name, got) <- Seq(
        "LES3" -> e.les3.knn(q, k),
        "DualTrans" -> e.dual.knn(q, k),
        "InvIdx" -> e.inv.knn(q, k))) {
        val gotSims = got.hits.map(h => math.round(h.sim * 1e9)).sorted
        require(gotSims == expKnn, s"$name knn similarity profile mismatch vs brute force")
      }
    }
  }

  def run(profiles: Seq[SetGen.Profile] =
            Seq(SetGen.kosarakLite, SetGen.livejLite, SetGen.aolLite),
          deltas: Seq[Double] = Seq(0.9, 0.8, 0.7, 0.6, 0.5),
          ks: Seq[Int] = Seq(1, 5, 10, 20, 50),
          nQueries: Int = 200): Seq[Row] =
    profiles.flatMap { p =>
      val db = SetGen.local(p)
      val engines = buildEngines(db, p.nTokens, Harness.defaultGroups(p.nSets), IOModel.InMemory)
      sweep(p.name, engines, Harness.sampleQueries(db, nQueries).toSeq, deltas, ks)
    }

  def render(title: String, rows: Seq[Row]): String =
    Fmt.table(title,
      Seq("dataset", "method", "query", "param", "cpu ms", "sim-io ms", "total ms"),
      rows.map(r => Seq(r.dataset, r.method, r.query, r.param.toString,
                        Fmt.ms(r.cpuMs), Fmt.ms(r.ioMs), Fmt.ms(r.cpuMs + r.ioMs))))
}
