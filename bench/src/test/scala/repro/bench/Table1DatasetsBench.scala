package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Table1

/** Table 1 — datasets for evaluation. Prints the paper's counts next to the
  * scaled synthetic stand-ins this reproduction serves (see DESIGN.md §5).
  */
class Table1DatasetsBench extends AnyFunSuite {

  test("Table 1: datasets (paper vs reproduction)") {
    val rendered = Table1.render()
    println()
    println("=" * 90)
    print(rendered)
    println("=" * 90)
    // the paper's Table 1 counts, verbatim
    assert(rendered.contains("480189") && rendered.contains("17770") &&
      rendered.contains("100480507"))
    assert(rendered.contains("1000990") && rendered.contains("624961"))
    assert(rendered.contains("1823179") && rendered.contains("136736"))
    assert(rendered.contains("1093514"))
    // and our scaled sizes
    assert(Table1.rows.forall(r => r.ourUsers > 0 && r.ourItems > 0))
  }
}
