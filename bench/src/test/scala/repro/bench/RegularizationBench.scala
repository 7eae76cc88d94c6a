package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Sweep
import repro.mf.MfTrainer

/** Effect of regularization on serving (§6.2 / Fig. 5 shape, via actually
  * trained MF models).
  *
  * We train SGD MF models on synthetic ratings over a λ sweep and measure
  * top-K=1 runtime of MM, LEMP and RECDEX on each. Paper claims checked:
  *  - blocked MM runtime is (nearly) flat in λ — it does the same FLOPs
  *    regardless of the weights;
  *  - index runtime varies with λ, generally improving as λ grows (tighter
  *    user/item similarity), i.e. the λ-extremes differ measurably;
  *  - larger λ shrinks factor norms (the §3 mechanism driving all of this).
  */
class RegularizationBench extends AnyFunSuite {

  test("Fig. 5 shape: index runtime depends on λ; MM runtime does not") {
    val nUsers = 2500; val nItems = 800; val f = 16
    val (ratings, _) = MfTrainer.syntheticRatings(nUsers, nItems, f,
      nRatings = 150000, noise = 0.3, seed = 21)
    val lambdas = Seq(0.0, 0.01, 0.05, 0.2, 0.8)

    Sweep.warmup()
    val rows = lambdas.map { l =>
      val model = MfTrainer.train(nUsers, nItems, f, ratings, lambda = l, epochs = 5)
      val rmse = MfTrainer.rmse(model, ratings)
      val norm = MfTrainer.meanRowNorm(model.users) + MfTrainer.meanRowNorm(model.items)
      val times = Seq("MM", "LEMP", "RECDEX").map { s =>
        // median of 3 to tame JIT/GC noise at this small scale
        val ts = (0 until 3).map(_ => Sweep.runFull(s, model.users, model.items, 1))
        s -> ts.sorted.apply(1)
      }.toMap
      (l, rmse, norm, times)
    }

    println()
    println("=" * 90)
    println("Fig. 5 shape (measured): top K=1 runtime vs regularization λ")
    println(f"${"λ"}%8s ${"RMSE"}%8s ${"Σnorm"}%8s ${"MM(s)"}%10s ${"LEMP(s)"}%10s ${"RECDEX(s)"}%10s")
    rows.foreach { case (l, rmse, norm, t) =>
      println(f"$l%8.3f $rmse%8.3f $norm%8.3f ${t("MM")}%10.3f ${t("LEMP")}%10.3f ${t("RECDEX")}%10.3f")
    }
    println("=" * 90)

    // §3 mechanism: λ shrinks norms monotonically across the sweep ends
    assert(rows.head._3 > rows.last._3,
      s"λ=${lambdas.head} norm ${rows.head._3} should exceed λ=${lambdas.last} norm ${rows.last._3}")

    // MM flat in λ: max/min MM runtime within 2.5x (timing noise allowance;
    // the paper's Fig. 5 shows an essentially flat line)
    val mms = rows.map(_._4("MM"))
    assert(mms.max / mms.min < 2.5, s"MM runtimes not flat: $mms")

    // Index runtimes react to λ much more than MM does (paper: they vary
    // heavily with λ). Compare relative spreads.
    val lemps = rows.map(_._4("LEMP"))
    val spreads = Map("MM" -> mms.max / mms.min, "LEMP" -> lemps.max / lemps.min)
    println(s"relative spreads: $spreads")
    assert(lemps.max / lemps.min > 1.15,
      s"LEMP runtime should vary with λ: $lemps")
  }
}
