package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.baselines.BruteForce
import repro.data.SetGen
import repro.embed.PTREmbedder
import repro.exp.Harness
import repro.partition.L2P

import scala.util.Random

/** Distributed-path tests: the DataFrame TGM build, the broadcast-model
  * group assignment, and the distributed range/kNN search — with range
  * results verified row-by-row against DuckDB computing Jaccard in SQL.
  */
class SparkSearchSpec extends SparkSpec {

  private lazy val profile = SetGen.kosarakLite.copy(name = "spark-test", nSets = 800,
    nTokens = 300)
  private lazy val db = SetGen.local(profile)
  private lazy val l2p = L2P.partition(db, new PTREmbedder(profile.nTokens),
    L2P.Config(targetGroups = 8, initGroups = 2, minGroupSize = 20,
      siamese = repro.ml.Siamese.Config(pairs = 2000, epochs = 2)))
  private lazy val dataDF = SetGen.toDF(spark, profile)
  private lazy val groupedDF = SparkSearch.assignGroups(dataDF, l2p.model).cache()

  test("Spark-generated data equals local generation") {
    val rows = dataDF.collect().map(r => (r.getLong(0), r.getSeq[Int](1).toArray)).sortBy(_._1)
    assert(rows.length == db.length)
    for ((sid, tokens) <- rows) assert(tokens.toSeq == db(sid.toInt).toSeq)
  }

  test("assignGroups UDF matches driver-side model inference") {
    val rows = groupedDF.select("sid", "gid").collect()
    for (r <- rows) {
      assert(r.getInt(1) == l2p.model.assign(db(r.getLong(0).toInt)),
        s"set ${r.getLong(0)}")
    }
  }

  test("model inference routes every training set to its trained group") {
    for (sid <- db.indices) {
      assert(l2p.model.assign(db(sid)) == l2p.grouping.assignment(sid), s"set $sid")
    }
  }

  test("DataFrame-built TGM equals locally-built TGM") {
    val local = TGM.build(db, new Grouping(db.indices.map(i => l2p.model.assign(db(i))).toArray,
      l2p.model.nGroups))
    val fromDF = SparkSearch.buildTGM(groupedDF, l2p.model.nGroups)
    assert(fromDF.nGroups == local.nGroups)
    val rnd = new Random(1)
    for (_ <- 1 to 30) {
      val q = SetOps.canon(Seq.fill(rnd.nextInt(8) + 1)(rnd.nextInt(profile.nTokens)))
      for (g <- 0 until local.nGroups) {
        assert(fromDF.matched(q, g) == local.matched(q, g))
        assert(fromDF.groupSize(g) == local.groupSize(g))
      }
    }
  }

  test("distributed range search matches DuckDB oracle (Jaccard in SQL)") {
    val tgm = SparkSearch.buildTGM(groupedDF, l2p.model.nGroups)
    val rnd = new Random(2)
    val queryArr = Array.tabulate(10)(i => (i.toLong, db(rnd.nextInt(db.length))))
    import spark.implicits._
    val queries = queryArr.toSeq.toDF("qid", "tokens")
    val delta = 0.5
    val result = SparkSearch.rangeSearch(groupedDF, queries, tgm, delta)
      .select(col("qid"), col("sid"), round(col("sim"), 6).as("sim"))

    val qtok = queryArr.toSeq.flatMap { case (qid, ts) => ts.map(t => (qid, t)) }
      .toDF("qid", "token")
    val stok = SetGen.explodedDF(spark, db, "sid")
    Oracle.assertEquivalent(result,
      s"""
         |WITH qs AS (SELECT qid, COUNT(*) AS nq FROM qtok GROUP BY qid),
         |     ss AS (SELECT sid, COUNT(*) AS ns FROM stok GROUP BY sid),
         |     ov AS (SELECT q.qid, s.sid, COUNT(*) AS c
         |            FROM qtok q JOIN stok s ON q.token = s.token
         |            GROUP BY q.qid, s.sid)
         |SELECT ov.qid AS qid,
         |       ov.sid AS sid,
         |       ROUND(ov.c * 1.0 / (qs.nq + ss.ns - ov.c), 6) AS sim
         |FROM ov JOIN qs ON ov.qid = qs.qid JOIN ss ON ov.sid = ss.sid
         |WHERE ov.c * 1.0 / (qs.nq + ss.ns - ov.c) >= $delta
         |""".stripMargin,
      "qtok" -> qtok, "stok" -> stok)
  }

  test("distributed kNN matches local brute force") {
    val tgm = SparkSearch.buildTGM(groupedDF, l2p.model.nGroups)
    val rnd = new Random(3)
    val queryArr = Array.tabulate(8)(i => (i.toLong, db(rnd.nextInt(db.length))))
    val hits = SparkSearch.knnSearch(groupedDF, queryArr, tgm, k = 10)
    val brute = new BruteForce(db)
    for ((qid, q) <- queryArr) {
      val exp = brute.knn(q, 10).hits.map(h => math.round(h.sim * 1e9)).sorted
      val got = hits(qid).map(h => math.round(h.sim * 1e9)).toSeq.sorted
      assert(got == exp, s"query $qid")
    }
  }

  test("distributed brute-force range equals distributed LES3 range") {
    val tgm = SparkSearch.buildTGM(groupedDF, l2p.model.nGroups)
    val rnd = new Random(4)
    import spark.implicits._
    val queryArr = Array.tabulate(5)(i => (i.toLong, db(rnd.nextInt(db.length))))
    val queries = queryArr.toSeq.toDF("qid", "tokens")
    val a = SparkSearch.rangeSearch(groupedDF, queries, tgm, 0.6)
      .select("qid", "sid").collect().map(r => (r.getLong(0), r.getLong(1))).sorted
    val b = SparkSearch.bruteForceRange(dataDF, queries, 0.6)
      .select("qid", "sid").collect().map(r => (r.getLong(0), r.getLong(1))).sorted
    assert(a.toSeq == b.toSeq)
  }

  test("knnSearch PE-relevant pruning: phase-2 groups bounded by group count") {
    val tgm = SparkSearch.buildTGM(groupedDF, l2p.model.nGroups)
    val queryArr = Array((0L, db(5)))
    val hits = SparkSearch.knnSearch(groupedDF, queryArr, tgm, k = 3)
    assert(hits(0L).length == 3)
    assert(hits(0L).head.sim == 1.0) // query drawn from the database
  }
}
