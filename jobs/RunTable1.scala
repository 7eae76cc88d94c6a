package repro.jobs

import repro.harness.Table1

/** spark-submit entrypoint: print Table 1 (datasets). */
object RunTable1 {
  def main(args: Array[String]): Unit = print(Table1.render())
}
