package repro.exp

import repro.data.SetGen
import repro.io.IOModel

/** Fig. 13 — disk-based comparison on the two large datasets (FS, PMC),
  * under the HDD cost model of [[IOModel.Hdd]] (see DESIGN.md,
  * Substitutions). Reported latency = measured CPU time + simulated
  * storage time; the paper's headline effect — brute force's sequential
  * scan beating the random-access baselines, and LES³ beating both via
  * contiguous group reads — is a property of the access patterns, which
  * the model reproduces exactly.
  */
object Fig13Exp {

  /** PMC-lite trimmed for the disk experiment (the full 200k profile is
    * used by the Spark scale-out bench).
    */
  val pmcDisk: SetGen.Profile = SetGen.pmcLite.copy(name = "PMC-disk", nSets = 100000)

  def run(profiles: Seq[SetGen.Profile] = Seq(SetGen.fsLite, pmcDisk),
          deltas: Seq[Double] = Seq(0.9, 0.7, 0.5),
          ks: Seq[Int] = Seq(1, 10, 50),
          nQueries: Int = 100, pairs: Int = 15000): Seq[Fig12Exp.Row] =
    profiles.flatMap { p =>
      val db = SetGen.local(p)
      // dataByteScale=1000 puts the modeled data volume in the paper's
      // tens-of-GBs, transfer-dominated regime (see IOModel.dataBytes);
      // candidate/group statistics come from the real measured search.
      val engines = Fig12Exp.buildEngines(db, p.nTokens,
        Harness.defaultGroups(p.nSets), IOModel.Hdd(dataByteScale = 1000),
        pairs, restarts = 1)
      Fig12Exp.sweep(p.name, engines, Harness.sampleQueries(db, nQueries).toSeq, deltas, ks)
    }
}
