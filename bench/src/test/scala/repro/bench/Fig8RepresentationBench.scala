package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig8Exp

/** Fig. 8 — PTR vs PCA / MDS / Binary Encoding / PTR-half. */
class Fig8RepresentationBench extends AnyFunSuite {

  test("Fig 8: PTR embeds orders of magnitude faster with equal-or-better search") {
    val rows = Fig8Exp.run()
    println(Fig8Exp.render(rows))
    val byName = rows.map(r => r.method -> r).toMap
    val ptr = byName("PTR")
    // paper: PTR is 10–20,000× faster to embed than PCA / MDS
    assert(byName("PCA").embedMs > ptr.embedMs * 5,
      s"PCA ${byName("PCA").embedMs} vs PTR ${ptr.embedMs}")
    assert(byName("MDS").embedMs > ptr.embedMs * 5,
      s"MDS ${byName("MDS").embedMs} vs PTR ${ptr.embedMs}")
    // paper: Binary Encoding has no Set Separation-Friendly Property →
    // weakest pruning; PTR must beat it clearly
    assert(ptr.peKnn > byName("BinaryEnc").peKnn,
      s"PTR PE ${ptr.peKnn} vs BinaryEnc ${byName("BinaryEnc").peKnn}")
    // PTR at least matches PTR-half on pruning efficiency (tolerance for noise)
    assert(ptr.peKnn >= byName("PTR-half").peKnn - 0.05)
    assert(rows.forall(r => r.knnMs > 0 && r.rangeMs >= 0))
  }
}
