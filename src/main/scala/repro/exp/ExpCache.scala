package repro.exp

import repro.data.SetGen

/** Memoized expensive artifacts shared across experiment modules — the
  * bench suites run in one JVM (`Test / parallelExecution := false`), so
  * the flagship KOSARAK-lite build is paid for once.
  */
object ExpCache {

  lazy val kosarakDb: Array[Array[Int]] = SetGen.local(SetGen.kosarakLite)

  /** Default LES³ build on KOSARAK-lite (L2P + TGM, §7.1 parameters). */
  lazy val kosarakBuilt: Harness.BuiltLes3 = {
    val p = SetGen.kosarakLite
    Harness.buildLes3(kosarakDb, p.nTokens, Harness.defaultGroups(p.nSets))
  }
}
