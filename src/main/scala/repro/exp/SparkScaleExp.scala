package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{SetOps, SparkSearch}
import repro.data.SetGen
import repro.embed.PTREmbedder
import repro.partition.L2P

import scala.util.Random

/** Distributed scale-out experiment (the reproduction band's
  * `distributed_dataflow` directive): LES³ as DataFrame operations —
  * L2P inference as a broadcast-model UDF, TGM built by DataFrame
  * aggregation, broadcast-TGM candidate pruning + Jaccard-UDF verification
  * — compared against a distributed brute-force cross join on PMC-lite.
  */
object SparkScaleExp {

  final case class Row(method: String, query: String, param: Double,
                       wallMs: Double, resultRows: Long)

  def run(spark: SparkSession, p: SetGen.Profile = SetGen.pmcLite,
          trainSample: Int = 20000, nGroups: Int = 256,
          deltas: Seq[Double] = Seq(0.9, 0.8), k: Int = 10,
          nQueries: Int = 300, pairs: Int = 15000, seed: Long = 151): Seq[Row] = {
    // Train the cascade on a driver-side sample, then assign the full
    // distributed dataset with the broadcast model.
    val rnd = new Random(seed)
    val sample = Array.fill(trainSample)(SetGen.generate(p, rnd.nextInt(p.nSets).toLong))
    val l2p = L2P.partition(sample, new PTREmbedder(p.nTokens),
      Harness.l2pConfig(sample.length, nGroups, pairs, restarts = 1))

    val data = SetGen.toDF(spark, p).cache()
    data.count() // materialize once; both methods read the cached data
    val grouped = SparkSearch.assignGroups(data, l2p.model).cache()
    grouped.count()
    val tgm = SparkSearch.buildTGM(grouped, l2p.model.nGroups)

    val queryArr: Array[(Long, Array[Int])] =
      Array.tabulate(nQueries)(i => (i.toLong, SetGen.generate(p, rnd.nextInt(p.nSets).toLong)))
    import spark.implicits._
    val queries = queryArr.toSeq.toDF("qid", "tokens")

    // Warm-up: exercise both physical plans once so JIT/codegen and the
    // generator caches don't land on whichever method runs first.
    val warm = queryArr.take(2).toSeq.toDF("qid", "tokens")
    SparkSearch.rangeSearch(grouped, warm, tgm, 0.8).count()
    SparkSearch.bruteForceRange(data, warm, 0.8).count()

    val rangeRows = deltas.flatMap { d =>
      val (les3Count, les3Ms) = Harness.timeMs(
        SparkSearch.rangeSearch(grouped, queries, tgm, d).count())
      val (bruteCount, bruteMs) = Harness.timeMs(
        SparkSearch.bruteForceRange(data, queries, d).count())
      require(les3Count == bruteCount,
        s"distributed range mismatch at delta=$d: les3=$les3Count brute=$bruteCount")
      Seq(Row("LES3-spark", "range", d, les3Ms, les3Count),
          Row("Brute-spark", "range", d, bruteMs, bruteCount))
    }

    val knnQueries = queryArr.take(50)
    val (knnHits, knnMs) = Harness.timeMs(SparkSearch.knnSearch(grouped, knnQueries, tgm, k))
    // Exactness check of distributed kNN against a local scan per query.
    val localDb = SetGen.local(p)
    for ((qid, q) <- knnQueries.take(5)) {
      val exact = localDb.map(s => SetOps.jaccard(q, s)).sorted.reverse.take(k)
        .map(s => math.round(s * 1e9)).toSeq
      val got = knnHits(qid).map(h => math.round(h.sim * 1e9)).toSeq
      require(got == exact, s"distributed kNN mismatch for query $qid")
    }
    rangeRows :+ Row("LES3-spark", "knn", k, knnMs, knnHits.values.map(_.length.toLong).sum)
  }

  def render(rows: Seq[Row]): String =
    Fmt.table("Spark scale-out: distributed LES3 vs distributed brute force (PMC-lite)",
      Seq("method", "query", "param", "wall ms (batch)", "result rows"),
      rows.map(r => Seq(r.method, r.query, r.param.toString, Fmt.ms(r.wallMs),
                        r.resultRows.toString)))
}
