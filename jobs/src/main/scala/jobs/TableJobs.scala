package jobs

import org.apache.spark.sql.SparkSession
import repro.exp.ExpSession

/** spark-submit entrypoints, one per reproduced table.
  *
  * Example:
  * {{{
  * spark-submit --class jobs.Table4Job repro-jobs.jar
  * REPRO_SCALE=0.25 spark-submit --class jobs.Table1Job repro-jobs.jar
  * }}}
  */
object TableJobs {
  def session(): ExpSession = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("gralmatch-repro")
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    new ExpSession(spark)
  }
}

/** Table 1 — dataset statistics. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val s = TableJobs.session()
    println(s.table1Text())
    s.spark.stop()
  }
}

/** Table 2 — blockings, records, candidate pairs. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val s = TableJobs.session()
    println(s.table2Text())
    s.spark.stop()
  }
}

/** Table 3 — fine-tuning pairwise scores on test pairs. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val s = TableJobs.session()
    println(s.table3Text())
    s.spark.stop()
  }
}

/** Table 4 — end-to-end entity group matching with GraLMatch. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val s = TableJobs.session()
    println(s.table4Text(s.table4Rows(includeSensitivity = true)))
    s.spark.stop()
  }
}
