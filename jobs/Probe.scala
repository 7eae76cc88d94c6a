package repro.jobs

import repro.harness.Sweep
import repro.mf.ModelZoo

/** Developer probe: run the full-strategy comparison for a subset of the
  * reference models / K values without the entire sweep. Used to calibrate
  * ModelZoo parameters against the paper's observed performance regime.
  *
  * Usage: Probe [modelSubstring] [k1,k2,...]
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val filter = args.lift(0).getOrElse("")
    val ks = args.lift(1).map(_.split(",").map(_.toInt).toSeq).getOrElse(Seq(1, 10))
    Sweep.warmup()
    for {
      model <- ModelZoo.referenceModels() if model.name.contains(filter)
      k <- ks
    } {
      val fulls = Sweep.AllStrategies.map(s => s -> Sweep.runFull(s, model.users, model.items, k))
      val fastest = fulls.minBy(_._2)._1
      println(f"${model.name}%-18s K=$k%-3d fastest=$fastest%-12s " +
        fulls.map { case (n, s) => f"$n=$s%.2fs" }.mkString(" "))
    }
  }
}
