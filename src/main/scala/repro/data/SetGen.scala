package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.SetOps

import java.util.concurrent.ConcurrentHashMap
import scala.util.Random

/** Deterministic synthetic set databases.
  *
  * The paper evaluates on six public datasets (Table 2) that cannot be
  * downloaded in this sealed container; each is replaced by a `Profile`
  * whose *shape* — token-frequency skew (Zipf), set-size distribution
  * (clipped exponential, matching the paper's avg/max/min), and the
  * |T|/|D| ratio — mirrors the original at laptop scale (see DESIGN.md,
  * Substitutions). Generation is a pure function of (profile, sid), so the
  * local array form and the Spark DataFrame form produce identical data
  * and the DuckDB oracle sees exactly what Spark sees.
  */
object SetGen {

  /** A synthetic dataset profile.
    *
    * Real set-similarity corpora (click sessions, friend lists, titles)
    * exhibit strong token co-occurrence: a set's tokens concentrate in a
    * topical neighbourhood. The generator therefore draws each set mostly
    * from one Zipf-popular *topic* (a contiguous token block) and the rest
    * from the global Zipf marginal — without this structure no partitioner
    * (the paper's or any baseline) has anything to exploit.
    *
    * @param name       label used in experiment output
    * @param nSets      |D|
    * @param nTokens    |T| (token ids are 0-based ranks; 0 = most frequent)
    * @param avgSize    target mean set size
    * @param maxSize    hard cap on set size
    * @param zipfAlpha  token-frequency skew (P[rank k] ∝ 1/k^alpha)
    * @param seed       generation seed
    * @param nTopics    number of topical token blocks; ≤ 0 → blocks of
    *                   ~4× the average set size, so near-duplicates stay
    *                   rare (as in the real corpora) while co-occurrence
    *                   structure remains strong
    * @param topicShare fraction of a set's tokens drawn from its topic
    */
  final case class Profile(name: String, nSets: Int, nTokens: Int, avgSize: Double,
                           maxSize: Int, zipfAlpha: Double, seed: Long,
                           nTopics: Int = -1, topicShare: Double = 0.9) {
    def topics: Int =
      if (nTopics > 0) nTopics
      else math.max(1, nTokens / math.max(10, (4 * avgSize).round.toInt))
  }

  // Scaled-down stand-ins for Table 2's datasets (|D| ↓ 50–4000×, shapes kept).
  val kosarakLite: Profile = Profile("KOSARAK-lite", 20000, 2000, 8.1, 500, 1.0, 101)
  val livejLite:   Profile = Profile("LIVEJ-lite",    8000, 8000, 35.1, 300, 0.8, 102)
  val dblpLite:    Profile = Profile("DBLP-lite",    20000, 6000,  8.7,  80, 0.9, 103)
  val aolLite:     Profile = Profile("AOL-lite",     20000, 5000,  3.0,  40, 1.0, 104)
  val fsLite:      Profile = Profile("FS-lite",      60000, 20000, 27.5, 600, 0.9, 105)
  val pmcLite:     Profile = Profile("PMC-lite",    200000, 8000,  8.8, 100, 1.0, 106)

  /** All profiles in Table 2 order. */
  val table2Profiles: Seq[Profile] =
    Seq(kosarakLite, livejLite, dblpLite, aolLite, fsLite, pmcLite)

  // ---- Zipf token sampler ------------------------------------------------

  // Cumulative Zipf weights are O(|T|) to build; memoize per (nTokens, alpha)
  // so Spark executors (same JVM in local mode) pay the cost once.
  private val cdfCache = new ConcurrentHashMap[(Int, Double), Array[Double]]()

  private def zipfCdf(nTokens: Int, alpha: Double): Array[Double] =
    cdfCache.computeIfAbsent((nTokens, alpha), { _ =>
      val cdf = new Array[Double](nTokens)
      var acc = 0.0
      var k = 1
      while (k <= nTokens) { acc += 1.0 / math.pow(k, alpha); cdf(k - 1) = acc; k += 1 }
      val norm = acc
      var i = 0
      while (i < nTokens) { cdf(i) /= norm; i += 1 }
      cdf
    })

  private def drawZipf(cdf: Array[Double], rnd: Random): Int = {
    val u = rnd.nextDouble()
    val pos = java.util.Arrays.binarySearch(cdf, u)
    val idx = if (pos >= 0) pos else -(pos + 1)
    math.min(idx, cdf.length - 1)
  }

  /** SplitMix64-style seed mixer so per-sid streams are independent. */
  private def mix(seed: Long, sid: Long): Long = {
    var z = seed + 0x9e3779b97f4a7c15L * (sid + 1)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Generate the set with id `sid` — pure in (profile, sid). */
  def generate(p: Profile, sid: Long): Array[Int] = {
    val rnd = new Random(mix(p.seed, sid))
    val cdf = zipfCdf(p.nTokens, p.zipfAlpha)
    // Clipped-exponential size with the profile's mean; min 1.
    val size = math.max(1, math.min(p.maxSize,
      (-p.avgSize * math.log1p(-rnd.nextDouble())).toInt))
    // The set's topic: a Zipf-popular contiguous token block.
    val nTopics = p.topics
    val topicCdf = zipfCdf(nTopics, p.zipfAlpha)
    val topic = drawZipf(topicCdf, rnd)
    val blockSize = math.max(1, p.nTokens / nTopics)
    val blockStart = math.min(topic * blockSize, p.nTokens - blockSize)
    val out = new java.util.TreeSet[Integer]()
    var attempts = 0
    while (out.size < size && attempts < size * 20) {
      if (rnd.nextDouble() < p.topicShare) {
        // uniform within the (small) topic block: topical blocks are far
        // smaller than real topical vocabularies, so skewing them too
        // would mass-produce duplicate sets
        out.add(blockStart + rnd.nextInt(blockSize))
      } else {
        out.add(drawZipf(cdf, rnd))
      }
      attempts += 1
    }
    // Fallback for heavy skew: fill with uniform draws to reach the size.
    while (out.size < size) out.add(rnd.nextInt(p.nTokens))
    val arr = new Array[Int](out.size)
    val it = out.iterator(); var i = 0
    while (it.hasNext) { arr(i) = it.next(); i += 1 }
    arr
  }

  /** Materialize the whole database locally (sid = array index). */
  def local(p: Profile): Array[Array[Int]] =
    Array.tabulate(p.nSets)(sid => generate(p, sid))

  /** The same database as a Spark DataFrame `(sid: Long, tokens: Array[Int])`. */
  def toDF(spark: SparkSession, p: Profile): DataFrame = {
    import spark.implicits._
    spark.range(p.nSets).map(sid => (sid, generate(p, sid))).toDF("sid", "tokens")
  }

  /** Exploded `(id, token)` form used to feed the DuckDB oracle. */
  def explodedDF(spark: SparkSession, db: Array[Array[Int]], idCol: String): DataFrame = {
    import spark.implicits._
    val rows = for (sid <- db.indices; t <- db(sid)) yield (sid.toLong, t)
    rows.toDF(idCol, "token")
  }

  /** Table 2-style statistics of a database. */
  final case class Stats(nSets: Int, maxSize: Int, minSize: Int, avgSize: Double, nTokens: Int)

  def stats(db: Array[Array[Int]]): Stats = {
    val sizes = db.map(_.length)
    val tokens = new java.util.HashSet[Int]()
    db.foreach(_.foreach(tokens.add(_)))
    Stats(db.length, sizes.max, sizes.min, sizes.sum.toDouble / db.length, tokens.size)
  }

  // ---- §7.7 power-law-similarity databases -------------------------------

  /** Databases whose pairwise-similarity mass is controlled by α, standing
    * in for the paper's P[sim = v] ∼ v^−α generator (§7.7): each set draws
    * a fraction ρ = u^α of its tokens from a small globally-shared "hot"
    * pool (`hotPool` tokens) and the rest from the large remaining
    * universe. Small α ⇒ ρ concentrates near 1 ⇒ *every* pair of sets
    * shares hot tokens (most sets similar); large α ⇒ ρ concentrates near
    * 0 ⇒ almost all pairs are dissimilar. This reproduces the §7.7 sweep —
    * similarity mass moving from broad to negligible as α grows — with
    * the paper's 20,000 sets over 20,000 tokens.
    */
  def powerLawSim(alpha: Double, nSets: Int = 20000, nTokens: Int = 20000,
                  setSize: Int = 20, hotPool: Int = 60, seed: Long = 707): Array[Array[Int]] = {
    require(hotPool + setSize < nTokens, "hot pool must be a small part of the universe")
    Array.tabulate(nSets) { sid =>
      val rnd = new Random(mix(seed + alpha.hashCode(), sid))
      val rho = math.pow(rnd.nextDouble(), alpha)
      val fromHot = math.min(setSize, math.round(rho * setSize).toInt)
      val out = new java.util.TreeSet[Integer]()
      while (out.size < math.min(fromHot, hotPool))
        out.add(rnd.nextInt(hotPool))
      while (out.size < setSize)
        out.add(hotPool + rnd.nextInt(nTokens - hotPool))
      val arr = new Array[Int](out.size)
      val it = out.iterator(); var i = 0
      while (it.hasNext) { arr(i) = it.next(); i += 1 }
      arr
    }
  }

  // ---- §7.8 update workloads --------------------------------------------

  /** Closed-universe insertions: new sets from the same distribution as `p`. */
  def closedUpdates(p: Profile, count: Int): Array[Array[Int]] =
    Array.tabulate(count)(i => generate(p.copy(seed = p.seed + 7777), i.toLong))

  /** Open-universe insertions: per §7.8, half the tokens of each new set come
    * from the original universe and half are previously-unseen token ids
    * (≥ `p.nTokens`).
    */
  def openUpdates(p: Profile, count: Int, newTokenUniverse: Int): Array[Array[Int]] =
    Array.tabulate(count) { i =>
      val base = generate(p.copy(seed = p.seed + 8888), i.toLong)
      val rnd = new Random(mix(p.seed + 9999, i.toLong))
      val replaced = base.zipWithIndex.map { case (t, j) =>
        if (j % 2 == 0) t else p.nTokens + rnd.nextInt(math.max(1, newTokenUniverse))
      }
      SetOps.canon(replaced)
    }
}
