package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Sweep

/** End-to-end index performance (§6.3, the text around Fig. 6).
  *
  * Paper claims being checked for *shape*:
  *  - RECDEX is on average 1.8x (up to 10.6x) faster than LEMP and >10x
  *    faster than FEXIPRO-SI/SIR;
  *  - blocked MM is faster than RECDEX on 34.8% of the 92 combinations;
  *  - of {LEMP, MM, RECDEX}, LEMP is fastest on 11/92, MM on 53/92, RECDEX
  *    on the rest — i.e. no strategy dominates, motivating the optimizer.
  */
class EndToEndBench extends AnyFunSuite {

  test("Fig. 6 aggregates: end-to-end strategy comparison") {
    val combos = Sweep.results
    val agg = Sweep.endToEndAggregates(combos)

    println()
    println("=" * 100)
    println(s"End-to-end aggregates over ${combos.size} combinations (paper values in []):")
    println(f"  RECDEX vs LEMP        avg ${agg.recdexVsLempAvg}%6.2fx  [1.8x]   max ${agg.recdexVsLempMax}%6.2fx  [10.6x]")
    println(f"  RECDEX vs FEXIPRO-SI  avg ${agg.recdexVsFexSiAvg}%6.2fx  [>10x]")
    println(f"  RECDEX vs MM          avg ${agg.recdexVsMmAvg}%6.2fx  [2.7x]")
    println(f"  MM faster than RECDEX in ${agg.mmFasterThanRecdexPct}%5.1f%% of combos  [34.8%%]")
    println(s"  3-way win share {LEMP, MM, RECDEX}: ${agg.winShare}  [11/92, 53/92, 28/92]")
    println("=" * 100)
    println("Per-combination full runtimes (seconds):")
    println(f"${"model"}%-20s ${"K"}%4s ${Sweep.AllStrategies.map(s => f"$s%12s").mkString}")
    combos.foreach { c =>
      println(f"${c.model}%-20s ${c.k}%4d ${Sweep.AllStrategies.map(s => f"${c.fullSeconds(s)}%12.3f").mkString}  fastest=${c.fastest}")
    }
    println("=" * 100)

    // RECDEX beats LEMP on average (paper: 1.8x)
    assert(agg.recdexVsLempAvg > 1.0, s"RECDEX vs LEMP avg ${agg.recdexVsLempAvg}")
    // RECDEX is faster than point-query FEXIPRO in the batch setting. The
    // paper reports >10x against the authors' binary; our FEXIPRO
    // reimplementation shares LEMP's norm-ordered scan and so is far
    // stronger than the original — the preserved shape is RECDEX > SI > SIR
    // (see EXPERIMENTS.md).
    assert(agg.recdexVsFexSiAvg > 1.1, s"RECDEX vs FEXIPRO-SI avg ${agg.recdexVsFexSiAvg}")
    // MM wins a substantial minority of combos against RECDEX (paper: 34.8%);
    // the point is that NEITHER always wins.
    assert(agg.mmFasterThanRecdexPct > 5.0 && agg.mmFasterThanRecdexPct < 95.0,
      s"MM-faster share ${agg.mmFasterThanRecdexPct}")
    // no strategy dominates the 3-way comparison
    assert(agg.winShare.size >= 2, s"win share ${agg.winShare} — one strategy dominates")
    // MM must be fastest-overall on some but not all combos (paper: 7/16
    // models had an MM win; 53/92 combos in the 3-way comparison)
    assert(agg.mmFastestOfAllPct > 0.0 && agg.mmFastestOfAllPct < 100.0)
  }
}
