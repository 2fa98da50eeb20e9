package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.harness.{Tables, Workloads}

/** Shared SparkSession bootstrap for the spark-submit entrypoints. */
object JobSession {
  def get(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Optional args: [R] [k] [sims]. */
  def params(args: Array[String]): (Int, Int, Int) = (
    args.lift(0).map(_.toInt).getOrElse(Tables.DefaultR),
    args.lift(1).map(_.toInt).getOrElse(Tables.DefaultK),
    args.lift(2).map(_.toInt).getOrElse(Tables.DefaultSims),
  )
}

/** Tab. 3: graph information + influence of 100 PaC-IM seeds. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("pacim-table3")
    val (r, k, sims) = JobSession.params(args)
    println(Tables.formatTable3(Tables.table3(spark, Workloads.all, r, k, sims)))
    spark.stop()
  }
}

/** Tab. 4: time/memory/influence of all systems, Consistent probabilities. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("pacim-table4")
    val (r, k, sims) = JobSession.params(args)
    println(Tables.formatTable4(Tables.table4(spark, Workloads.all, _.consistent, r, k, sims)))
    spark.stop()
  }
}

/** Tab. 5: #re-evaluations of CELF vs P-tree vs Win-Tree. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val (r, k, _) = JobSession.params(args)
    println(Tables.formatTable5(Tables.table5(Workloads.all, r, k)))
  }
}

/** Tab. 6 (appendix): Table-4 metrics under Uniform edge probabilities. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("pacim-table6")
    val (r, k, sims) = JobSession.params(args)
    println(Tables.formatTable4(Tables.table4(spark, Workloads.appendix, _.uniform, r, k, sims)))
    spark.stop()
  }
}

/** Tab. 7 (appendix): Table-4 metrics under WIC edge probabilities. */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("pacim-table7")
    val (r, k, sims) = JobSession.params(args)
    println(Tables.formatTable4(Tables.table4(spark, Workloads.appendix, _.wic, r, k, sims)))
    spark.stop()
  }
}
