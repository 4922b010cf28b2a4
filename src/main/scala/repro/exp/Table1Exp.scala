package repro.exp

import repro.data.Datasets

/** Reproduces paper Table 1 (summary of dataset statistics) from our
  * synthetic dataset specs. The paper's numbers are embedded so the harness
  * prints both side by side.
  */
object Table1Exp {

  /** (#tables, #inputs, numeric, categorical, #features, feat-numeric, feat-categ). */
  val paper: Map[String, (Int, Int, Int, Int, Int, Int, Int)] = Map(
    "CreditCard" -> (1, 28, 28, 0, 28, 28, 0),
    "Hospital"   -> (1, 24, 9, 15, 59, 9, 50),
    "Expedia"    -> (3, 28, 8, 20, 3965, 8, 3957),
    "Flights"    -> (4, 37, 4, 33, 6475, 4, 6471),
  )

  final case class Row(
      dataset: String, nTables: Int, nInputs: Int, numeric: Int, categorical: Int,
      features: Int, featNumeric: Int, featCateg: Int,
  ) {
    def tuple: (Int, Int, Int, Int, Int, Int, Int) =
      (nTables, nInputs, numeric, categorical, features, featNumeric, featCateg)
  }

  def measured: Seq[Row] = Datasets.allSpecs.map { s =>
    Row(s.name, s.nTables, s.nInputs, s.numeric.size, s.categorical.size,
      s.encodedFeatures, s.numeric.size, s.categorical.map(_.card).sum)
  }

  def render: String = {
    val headers = Seq("dataset", "#tables", "#inputs (num/cat)", "#features (num/cat)", "matches paper")
    val rows = measured.map { r =>
      Seq(r.dataset, r.nTables.toString,
        s"${r.nInputs} (${r.numeric}/${r.categorical})",
        s"${r.features} (${r.featNumeric}/${r.featCateg})",
        if (paper(r.dataset) == r.tuple) "yes" else s"NO: expected ${paper(r.dataset)}")
    }
    Harness.renderTable("Table 1: dataset statistics", headers, rows)
  }
}
