package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** Shared bootstrap for the spark-submit entrypoints: one local session,
  * bench-scale SF=0.1 data and the bench search budget (override with
  * `--sf <x>` as the first two args).
  */
object Jobs {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", "8")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def sfFrom(args: Array[String], default: Double = 0.1): Double =
    args.sliding(2).collectFirst { case Array("--sf", v) => v.toDouble }.getOrElse(default)

  def experiments(app: String, args: Array[String]): Experiments =
    new Experiments(session(app), sfFrom(args), Experiments.benchBudget)
}

/** Reproduces paper Table I (dataset statistics). */
object RunTableI {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table1", args).tableI.render)
}

/** Reproduces paper Table II (query template configuration). */
object RunTableII {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table2", args).tableII.render)
}

/** Reproduces paper Table III (main one-to-many comparison). */
object RunTableIII {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table3", args).tableIII.render)
}

/** Reproduces paper Tables IV and V (Covtype/Household stats + templates). */
object RunTableIV {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table45", args).tableIVV.render)
}

/** Reproduces paper Table VI (single-table / one-to-one comparison). */
object RunTableVI {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table6", args).tableVI.render)
}

/** Reproduces paper Table VII (QTI / warm-up ablation). */
object RunTableVII {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table7", args).tableVII.render)
}

/** Reproduces paper Table VIII (low-cost proxy sweep). */
object RunTableVIII {
  def main(args: Array[String]): Unit = println(Jobs.experiments("table8", args).tableVIII.render)
}
