package repro.bench

/** Reproduces paper Tables I, II, IV and V: dataset statistics and query
  * template configurations (at the reproduction's lite scale).
  */
class Bench1TablesI_II_IV_V extends BenchSuite {

  test("Table I: one-to-many dataset statistics") {
    val t = exp.tableI
    show(t)
    assert(t.rows.map(_(0)) == Vector("Tmall", "Instacart", "Student", "Merchant"))
    // Relevant tables are one-to-many scale: far more rows than train.
    t.rows.foreach { r =>
      val relRows = r(2).toLong
      val train = r(3).split("/")(0).toLong
      assert(relRows > train * 3, r.toString)
    }
  }

  test("Table II: query template configuration (one-to-many)") {
    val t = exp.tableII
    show(t)
    // Paper shape: 15 aggregation functions everywhere; attr counts per
    // dataset (Merchant reduced 15 -> 9, see DESIGN.md §3).
    assert(t.rows.forall(_(1) == "15"))
    assert(t.rows.map(r => r(0) -> r(3)).toMap ==
      Map("Tmall" -> "5", "Instacart" -> "8", "Student" -> "10", "Merchant" -> "9"))
    assert(t.rows.find(_(0) == "Tmall").get(4) == "user_id+merchant_id")
  }

  test("Tables IV+V: single-table / one-to-one statistics and templates") {
    val t = exp.tableIVV
    show(t)
    assert(t.rows.map(_(0)) == Vector("Covtype", "Household"))
    t.rows.foreach { r =>
      assert(r(1).toLong == r(2).split("/").map(_.toLong).sum) // one-to-one
      assert(r(6) == "data_index")
    }
  }
}
