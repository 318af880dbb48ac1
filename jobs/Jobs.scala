package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.graph.GraphGen

/** Shared session builder for the spark-submit entrypoints. */
private[jobs] object JobSession {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "8")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

/** Reproduces paper Table 2 (SSSP updates per vertex). */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("slfe-table2")
    Harness.table2(spark, GraphGen.datasets, println)
    spark.stop()
  }
}

/** Reproduces paper Table 4 (dataset statistics of the scaled stand-ins). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("slfe-table4")
    Harness.table4(spark, GraphGen.datasets, println)
    spark.stop()
  }
}

/** Reproduces paper Table 5 (all systems x five apps x seven graphs). */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("slfe-table5")
    val specs = if (args.isEmpty) GraphGen.datasets
                else GraphGen.datasets.filter(s => args.contains(s.name))
    Harness.table5(spark, specs, println)
    spark.stop()
  }
}

/** RRG preprocessing overhead report (paper Fig. 8 companion). */
object RRGJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("slfe-rrg")
    Harness.overhead(spark, GraphGen.datasets, println)
    spark.stop()
  }
}
