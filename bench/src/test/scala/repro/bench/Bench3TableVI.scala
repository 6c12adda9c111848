package repro.bench

/** Reproduces paper Table VI: single-table (Covtype) and one-to-one
  * (Household) scenarios — 2 datasets x 3 traditional models x 11 methods
  * including ARDA and AutoFeature (MAB/DQN).
  *
  * Shape: FeatAug is competitive on one-to-one tables too (paper: best in
  * 4/6 scenarios) — we assert it beats plain Featuretools on average and
  * is never catastrophically worse than the best baseline.
  */
class Bench3TableVI extends BenchSuite {

  test("Table VI: single-table / one-to-one results") {
    val t = exp.tableVI
    show(t)

    def rowsOf(method: String): Vector[Vector[Option[Double]]] =
      t.rows.filter(_(1) == method).map(_.drop(2).map(cell))

    val fa = rowsOf("FeatAug").flatten.flatten
    val ft = rowsOf("FT").flatten.flatten
    assert(fa.size == 6 && ft.size == 6)
    info(f"mean F1: FeatAug ${fa.sum / 6}%.4f vs FT ${ft.sum / 6}%.4f")
    assert(fa.sum > ft.sum, s"FeatAug mean F1 should beat FT: $fa vs $ft")

    // ARDA / AutoFeature rows exist and produce valid F1 scores.
    Seq("ARDA", "AutoFeat-MAB", "AutoFeat-DQN").foreach { m =>
      val vals = rowsOf(m).flatten.flatten
      assert(vals.size == 6, m)
      vals.foreach(v => assert(v >= 0.0 && v <= 1.0, s"$m $v"))
    }

    // FeatAug is within reach of the best method everywhere (no collapse).
    val best = t.rows.drop(2).flatMap(_.drop(2).map(cell)).flatten.max
    assert(fa.max > best * 0.7, s"FeatAug best ${fa.max} vs global best $best")
  }
}
