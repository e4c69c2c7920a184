package repro.core

/** Set algebra over the canonical in-memory set representation: a sorted
  * array of distinct non-negative token ids.
  *
  * Every similarity in the paper (§2, §3.2) reduces to the intersection
  * size of two such arrays, so this module keeps the merge-based
  * intersection in one place and derives Jaccard / Dice / Cosine /
  * overlap from it.
  */
object SetOps {

  /** Canonicalize an arbitrary token collection into sorted-distinct form. */
  def canon(tokens: Iterable[Int]): Array[Int] = {
    val a = tokens.toArray.distinct
    java.util.Arrays.sort(a)
    a
  }

  /** |a ∩ b| by linear merge; both inputs must be sorted-distinct. */
  def intersectSize(a: Array[Int], b: Array[Int]): Int = {
    var i = 0; var j = 0; var c = 0
    while (i < a.length && j < b.length) {
      val x = a(i); val y = b(j)
      if (x == y) { c += 1; i += 1; j += 1 }
      else if (x < y) i += 1
      else j += 1
    }
    c
  }

  /** Jaccard similarity |a∩b| / |a∪b|; empty-vs-empty defined as 1.0. */
  def jaccard(a: Array[Int], b: Array[Int]): Double = {
    if (a.isEmpty && b.isEmpty) return 1.0
    val inter = intersectSize(a, b)
    inter.toDouble / (a.length + b.length - inter)
  }

  /** Dice coefficient 2|a∩b| / (|a|+|b|). */
  def dice(a: Array[Int], b: Array[Int]): Double = {
    if (a.isEmpty && b.isEmpty) return 1.0
    2.0 * intersectSize(a, b) / (a.length + b.length)
  }

  /** Cosine similarity |a∩b| / sqrt(|a||b|). */
  def cosine(a: Array[Int], b: Array[Int]): Double = {
    if (a.isEmpty && b.isEmpty) return 1.0
    if (a.isEmpty || b.isEmpty) return 0.0
    intersectSize(a, b) / math.sqrt(a.length.toDouble * b.length)
  }

  /** Similarity measures satisfying the TGM Applicability Property (Thm 3.1).
    *
    * `sim` is the pairwise measure; `ubFromOverlap(m, q)` is Sim(Q, R) for
    * |R| = m matched query tokens out of |Q| = q — the tight group upper
    * bound of Eq. 2 generalized per §3.2 (R itself is the best possible set).
    */
  sealed abstract class Measure(val name: String) {
    def sim(a: Array[Int], b: Array[Int]): Double
    def ubFromOverlap(matched: Int, qSize: Int): Double
  }

  case object Jaccard extends Measure("jaccard") {
    def sim(a: Array[Int], b: Array[Int]): Double = jaccard(a, b)
    def ubFromOverlap(matched: Int, qSize: Int): Double =
      if (qSize == 0) 1.0 else matched.toDouble / qSize
  }

  case object Cosine extends Measure("cosine") {
    def sim(a: Array[Int], b: Array[Int]): Double = cosine(a, b)
    // Best set is R itself: |Q∩R|/sqrt(|Q||R|) = m/sqrt(q*m) = sqrt(m/q).
    def ubFromOverlap(matched: Int, qSize: Int): Double =
      if (qSize == 0) 1.0 else math.sqrt(matched.toDouble / qSize)
  }

  case object Dice extends Measure("dice") {
    def sim(a: Array[Int], b: Array[Int]): Double = dice(a, b)
    // Best set is R: 2m/(q+m), increasing in m.
    def ubFromOverlap(matched: Int, qSize: Int): Double =
      if (qSize == 0) 1.0 else 2.0 * matched / (qSize + matched)
  }
}
