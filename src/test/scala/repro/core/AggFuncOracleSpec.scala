package repro.core

import repro.{Oracle, SparkSpec}

/** Cross-checks every oracle-safe aggregation function against DuckDB,
  * with and without predicates — a wrong Catalyst expression or a broken
  * custom aggregate fails here, not just "it ran".
  */
class AggFuncOracleSpec extends SparkSpec with MiniData {

  private def oracleCheck(q: QuerySpec): Unit =
    Oracle.assertEquivalent(executor.featureDf(q), executor.duckSql(q, "r"), "r" -> relevant)

  private val noPreds = Vector.empty[Predicate]
  private val catPred = Vector(Predicate("cat", Some("A"), None, None))
  private val rangePred = Vector(Predicate("t", None, Some(2.0), Some(7.0)))
  private val bothPreds = catPred ++ rangePred

  for (agg <- AggFunc.all if agg.oracleSafe) {
    test(s"${agg.name}(amt) GROUP BY uid matches DuckDB") {
      oracleCheck(QuerySpec(agg, "amt", noPreds, Vector("uid")))
    }
    test(s"${agg.name}(amt) with categorical + range predicates matches DuckDB") {
      oracleCheck(QuerySpec(agg, "amt", bothPreds, Vector("uid")))
    }
  }

  test("equality predicate alone matches DuckDB") {
    oracleCheck(QuerySpec(AggFunc.Avg, "amt", catPred, Vector("uid")))
  }

  test("one-sided range predicates match DuckDB (lower bound only)") {
    oracleCheck(QuerySpec(AggFunc.Sum, "amt", Vector(Predicate("t", None, Some(5.0), None)), Vector("uid")))
  }

  test("one-sided range predicates match DuckDB (upper bound only)") {
    oracleCheck(QuerySpec(AggFunc.Count, "amt", Vector(Predicate("t", None, None, Some(3.0))), Vector("uid")))
  }

  test("aggregating the numeric predicate column itself matches DuckDB") {
    oracleCheck(QuerySpec(AggFunc.Median, "t", rangePred, Vector("uid")))
  }

  test("COUNT_DISTINCT over a low-cardinality column matches DuckDB") {
    oracleCheck(QuerySpec(AggFunc.CountDistinct, "t", catPred, Vector("uid")))
  }

  test("ENTROPY over a low-cardinality column matches DuckDB") {
    oracleCheck(QuerySpec(AggFunc.Entropy, "t", noPreds, Vector("uid")))
  }

  test("MAD over a low-cardinality column matches DuckDB") {
    oracleCheck(QuerySpec(AggFunc.Mad, "t", noPreds, Vector("uid")))
  }
}
