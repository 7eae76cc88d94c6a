package repro.jobs

import repro.harness.Sweep
import repro.mf.ModelZoo
import repro.recdex.Recdex

/** Developer probe: RECDEX blocking-factor (B) parameter sweep across the
  * reference models, mirroring the paper's B/C tuning sweep (§5.5). */
object ProbeB {
  def main(args: Array[String]): Unit = {
    val bs = args.lift(0).map(_.split(",").map(_.toInt).toSeq)
      .getOrElse(Seq(0, 128, 256, 512, 1024, 2048))
    val k = args.lift(1).map(_.toInt).getOrElse(1)
    Sweep.warmup()
    val models = ModelZoo.referenceModels()
      .filter(m => Set("Netflix-NOMAD-f50", "R2-NOMAD-f50", "KDD-REF-f51", "GloVe-f50")(m.name))
    for (model <- models) {
      val line = bs.map { b =>
        val solver = new Recdex(numClusters = Sweep.RecdexC, blockSize = b)
        val prep = solver.prepare(model.items)
        val idx = prep.asInstanceOf[repro.recdex.RecdexPrepared].buildUserIndexImpl(model.users)
        idx.queryAllLesion(k, shareBlocked = b > 0) // warm
        val ts = (0 until 3).map { _ =>
          val t0 = System.nanoTime()
          idx.queryAllLesion(k, shareBlocked = b > 0)
          (System.nanoTime() - t0) / 1e9
        }
        f"B=$b:${ts.sorted.apply(1)}%.3fs"
      }
      println(f"${model.name}%-20s K=$k ${line.mkString(" ")}")
    }
  }
}
