package repro.harness

import repro.mf.ModelZoo

/** Table 1 — datasets for evaluation: paper-scale counts alongside the
  * scaled synthetic stand-ins this reproduction actually serves.
  */
object Table1 {

  final case class Row(dataset: String, paperUsers: Long, paperItems: Long,
                       paperRatings: Long, ourUsers: Int, ourItems: Int)

  def rows: Seq[Row] = {
    val models = ModelZoo.referenceModels()
    val byDataset = models.groupBy(_.dataset)
    Seq("Netflix", "KDD", "R2", "GloVe-Twitter").map { ds =>
      val m = byDataset(ds).head
      Row(ds, m.paperUsers, m.paperItems, m.paperRatings, m.users.rows, m.items.rows)
    }
  }

  def render(): String = {
    val sb = new StringBuilder
    sb ++= "Table 1: Datasets for evaluation (paper scale vs. reproduction scale)\n"
    sb ++= f"${"Dataset"}%-15s ${"paper#users"}%12s ${"paper#items"}%12s ${"paper#ratings"}%14s ${"our#users"}%10s ${"our#items"}%10s\n"
    rows.foreach { r =>
      val ratings = if (r.paperRatings < 0) "-" else r.paperRatings.toString
      sb ++= f"${r.dataset}%-15s ${r.paperUsers}%12d ${r.paperItems}%12d ${ratings}%14s ${r.ourUsers}%10d ${r.ourItems}%10d\n"
    }
    sb.result()
  }
}
