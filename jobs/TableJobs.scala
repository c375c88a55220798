package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Tables

/** spark-submit entrypoints, one per reproduced table, e.g.
  * `spark-submit --class repro.jobs.Table5Job repro.jar`.
  * Each prints the paper-vs-ours table and persists it to `results/`.
  */
object JobUtil {
  def session(): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("dupin-repro")
      .config("spark.sql.shuffle.partitions", "16")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

object Table2Job { def main(args: Array[String]): Unit = Tables.table2() }

object Table3Job { def main(args: Array[String]): Unit = Tables.table3() }

object Table4Job { def main(args: Array[String]): Unit = Tables.table4() }

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session()
    try Tables.table5(Some(spark)) finally spark.stop()
  }
}

object Table6Job { def main(args: Array[String]): Unit = Tables.table6() }

object Table7Job { def main(args: Array[String]): Unit = Tables.table7() }

object Table8Job { def main(args: Array[String]): Unit = Tables.table8() }

object Table9Job { def main(args: Array[String]): Unit = Tables.table9() }

object Table10Job { def main(args: Array[String]): Unit = Tables.table10() }

/** All tables in paper order (the full evaluation reproduction). */
object AllTablesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session()
    try {
      Tables.table2(); Tables.table3(); Tables.table4()
      Tables.table5(Some(spark)); Tables.table6()
      Tables.table7(); Tables.table8()
      Tables.table9(); Tables.table10()
    } finally spark.stop()
  }
}
