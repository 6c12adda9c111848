package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Executes predicate-aware feature queries against the relevant table via
  * the DataFrame API (Catalyst plans the filter → hash-aggregate →
  * shuffle), and augments the training table per Definition 3.
  *
  * Two equivalent materialization paths exist (tests prove equivalence):
  *
  *  - [[augment]]: the paper's LEFT JOIN of D with q(R) — used for final
  *    feature materialization and the DuckDB oracle tests;
  *  - [[featureValues]]: the hot search path — the (small) aggregated
  *    result is collected to a key→value map on the driver and aligned to
  *    the training rows, avoiding a Spark join per candidate query. The
  *    group-by aggregation itself still runs in Spark.
  *
  * NULL features (keys with no qualifying rows, or NaN-producing
  * aggregates such as variance of a single row) are imputed with 0.0 on
  * both paths, mirroring Featuretools' fillna(0) convention.
  */
final class FeatureQueryExecutor(
    val train: DataFrame,
    val relevant: DataFrame,
    val allKeys: Vector[String],
    precollectedKeys: Option[Array[Vector[String]]] = None,
) {
  Aggregates.register(train.sparkSession)

  /** Train-side key tuples in row order — collected once, or provided by
    * the caller when it already collected the training rows (guarantees
    * row alignment with the caller's feature matrix).
    */
  lazy val trainKeyRows: Array[Vector[String]] = precollectedKeys.getOrElse {
    train.select(allKeys.map(col): _*).collect()
      .map(r => Vector.tabulate(allKeys.size)(i => String.valueOf(r.get(i))))
  }

  private def predColumn(p: Predicate): Option[Column] = {
    if (p.isEmpty) None
    else {
      val c = col(p.attr)
      val parts =
        p.eqValue.map(v => c === lit(v)).toList ++
          p.lo.map(l => c.cast("double") >= lit(l)).toList ++
          p.hi.map(h => c.cast("double") <= lit(h)).toList
      Some(parts.reduce(_ && _))
    }
  }

  /** q(R): keys + `feature` (double; NaN normalized to NULL). */
  def featureDf(q: QuerySpec): DataFrame = {
    val filtered = q.preds.flatMap(predColumn).foldLeft(relevant)((df, c) => df.filter(c))
    val raw = filtered
      .groupBy(q.keys.map(col): _*)
      .agg(q.agg.sparkExpr(col(q.aggAttr)).cast("double").as("feature"))
    raw.withColumn("feature", when(isnan(col("feature")), lit(null)).otherwise(col("feature")))
  }

  /** Definition 3: D LEFT JOIN q(R) with the feature named `name`. */
  def augment(q: QuerySpec, name: String): DataFrame = {
    val f = featureDf(q).withColumnRenamed("feature", name)
    train.join(f, q.keys, "left").na.fill(0.0, Seq(name))
  }

  /** The feature column aligned to [[trainKeyRows]] (search fast path). */
  def featureValues(q: QuerySpec): Array[Double] = {
    val keyIdx = q.keys.map(allKeys.indexOf)
    require(keyIdx.forall(_ >= 0), s"query keys ${q.keys} not a subset of $allKeys")
    val m = featureDf(q).collect().iterator.map { r =>
      val k = Vector.tabulate(q.keys.size)(i => String.valueOf(r.get(i)))
      val v = if (r.isNullAt(q.keys.size)) 0.0 else r.getDouble(q.keys.size)
      k -> v
    }.toMap
    trainKeyRows.map { full =>
      val k = keyIdx.map(full)
      m.getOrElse(k, 0.0)
    }
  }

  /** DuckDB SQL equivalent of [[featureDf]] over VARCHAR-typed `table`
    * (see [[repro.Oracle]]): used by correctness tests only.
    */
  def duckSql(q: QuerySpec, table: String): String = {
    val where = q.preds.filterNot(_.isEmpty).flatMap { p =>
      p.eqValue.map(v => s"${p.attr} = '${v.replace("'", "''")}'").toList ++
        p.lo.map(l => s"CAST(${p.attr} AS DOUBLE) >= $l").toList ++
        p.hi.map(h => s"CAST(${p.attr} AS DOUBLE) <= $h").toList
    }
    val w = if (where.isEmpty) "" else where.mkString(" WHERE ", " AND ", "")
    val keys = q.keys.mkString(", ")
    s"SELECT $keys, CAST(${q.agg.duckExpr(q.aggAttr)} AS DOUBLE) AS feature FROM $table$w GROUP BY $keys"
  }
}
