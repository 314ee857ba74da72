package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** Shared spark-submit plumbing for the per-table entrypoints.
  *
  * Usage: `spark-submit --class repro.jobs.RunTable4 repro.jar [domain ...]`
  * — with no args every domain runs.
  */
object Jobs {
  def session(): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("vaer-repro")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def domains(args: Array[String]): Seq[String] =
    if (args.isEmpty) Experiments.AllDomains else args.toSeq
}

/** Table II — generated dataset statistics. */
object RunTable2 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    Experiments.table2(spark, Jobs.domains(args)).foreach(r =>
      println(f"${r.domain}%-7s card=${r.cardA}/${r.cardB} arity=${r.arity} " +
        f"train=${r.train} test=${r.test} ${if (r.clean) "clean" else "noisy"}"))
    spark.stop()
  }
}

/** Table IV — representation learning P/R/F1@10 per IR type. */
object RunTable4 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    Experiments.table4(spark, Jobs.domains(args), Experiments.AllProviders).foreach(println)
    spark.stop()
  }
}

/** Tables V + VI — supervised matching effectiveness and training times. */
object RunTable56 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    Experiments.table56(spark, Jobs.domains(args)).foreach(println)
    spark.stop()
  }
}

/** Table VII — transferred vs local representation models. */
object RunTable7 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    Experiments.table7(spark, Jobs.domains(args)).foreach(println)
    spark.stop()
  }
}

/** Table VIII — active learning (Bootstrap / A250 / Full). */
object RunTable8 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    Experiments.table8(spark, Jobs.domains(args)).foreach(println)
    spark.stop()
  }
}
