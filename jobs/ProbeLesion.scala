package repro.jobs

import repro.harness.Sweep
import repro.mf.ModelZoo
import repro.recdex.{Recdex, RecdexPrepared}

/** Developer probe: repeated timings of RECDEX with and without the blocked
  * head, to diagnose lesion-study noise. */
object ProbeLesion {
  def main(args: Array[String]): Unit = {
    val modelName = args.lift(0).getOrElse("Netflix-NOMAD-f50")
    val reps = args.lift(1).map(_.toInt).getOrElse(5)
    val model = ModelZoo.referenceModels().find(_.name == modelName).get
    val solver = new Recdex(numClusters = Sweep.RecdexC, blockSize = Sweep.RecdexB)
    val prepared = solver.prepare(model.items).asInstanceOf[RecdexPrepared]
    // warmup
    prepared.queryBatchImpl(model.users.sliceRows(0, 1000), 1, shareBlocked = true)
    prepared.queryBatchImpl(model.users.sliceRows(0, 1000), 1, shareBlocked = false)
    for (r <- 0 until reps) {
      val (_, tb) = Sweep.time(prepared.queryBatchImpl(model.users, 1, shareBlocked = true))
      val (_, tu) = Sweep.time(prepared.queryBatchImpl(model.users, 1, shareBlocked = false))
      println(f"rep $r blocked=$tb%.3f unblocked=$tu%.3f ratio=${tu / tb}%.2f")
    }
  }
}
