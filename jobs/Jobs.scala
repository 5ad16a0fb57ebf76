package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.BenchTables

/** Shared session bootstrap for the spark-submit entrypoints. */
object JobSession {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"))
      .config("spark.sql.adaptive.coalescePartitions.enabled", "false")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

/** Table 2 — dataset properties. `spark-submit --class repro.jobs.Table2Job`. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("pathenum-table2")
    try println(BenchTables.table2(spark)) finally spark.stop()
  }
}

/** Table 3 — overall comparison of the five competitors at k=6. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("pathenum-table3")
    try println(BenchTables.table3(spark)) finally spark.stop()
  }
}

/** Table 4 — query-time distribution on ep/gg, k=3..8. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("pathenum-table4")
    try println(BenchTables.table4(spark)) finally spark.stop()
  }
}

/** Table 5 — short vs long queries on ep, k=8. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("pathenum-table5")
    try println(BenchTables.table5(spark)) finally spark.stop()
  }
}

/** Table 6 — average / maximum result counts on ep/gg. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("pathenum-table6")
    try println(BenchTables.table6(spark)) finally spark.stop()
  }
}

/** Table 7 — memory of the index and of IDX-JOIN partial results. */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("pathenum-table7")
    try println(BenchTables.table7(spark)) finally spark.stop()
  }
}
