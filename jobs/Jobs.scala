package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** spark-submit entrypoints, one per reproduced table. Each prints the
  * paper-vs-measured table to stdout. Example:
  *
  *   spark-submit --class repro.jobs.Table7Job target/scala-2.13/repro_2.13-*.jar
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def run(name: String)(body: SparkSession => String): Unit = {
    val spark = session(name)
    try println(body(spark))
    finally spark.stop()
  }
}

object Table2Job { def main(args: Array[String]): Unit = Jobs.run("table2")(Table2.main0) }
object Table4Job { def main(args: Array[String]): Unit = Jobs.run("table4")(Table4.main0) }
object Table5Job { def main(args: Array[String]): Unit = Jobs.run("table5")(Table5.main0) }
object Table6Job { def main(args: Array[String]): Unit = Jobs.run("table6")(Table6.main0) }
object Table7Job {
  def main(args: Array[String]): Unit = Jobs.run("table7") { spark =>
    Table78.renderTable7(Table78.table7(Table78.compute(spark)))
  }
}
object Table8Job {
  def main(args: Array[String]): Unit = Jobs.run("table8") { spark =>
    Table78.renderTable8(Table78.table8(Table78.compute(spark)))
  }
}
object Table9Job { def main(args: Array[String]): Unit = Jobs.run("table9")(Table9.main0) }
