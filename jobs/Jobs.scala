package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoints, one per evaluation table.
  *
  *   spark-submit --class repro.jobs.Table2Linear target/scala-2.13/repro_*.jar [factor]
  *
  * `factor` scales every scenario's bench size (default 1.0).
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def factor(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(1.0)
}

object Table1Stats {
  def main(args: Array[String]): Unit =
    Tables.table1(Jobs.session("table1"), Jobs.factor(args))
}

object Table2Linear {
  def main(args: Array[String]): Unit =
    Tables.table2(Jobs.session("table2"), Jobs.factor(args))
}

object Table3Datalog {
  def main(args: Array[String]): Unit =
    Tables.table3(Jobs.session("table3"), Jobs.factor(args))
}

object Table4ChaseBench {
  def main(args: Array[String]): Unit =
    Tables.table4(Jobs.session("table4"), Jobs.factor(args))
}

object Table6Rdfs {
  def main(args: Array[String]): Unit =
    Tables.table6(Jobs.session("table6"), Jobs.factor(args))
}

object Table7Scalability {
  def main(args: Array[String]): Unit = {
    val sweep = if (args.nonEmpty) args.toSeq.map(_.toInt)
                else Seq(50, 100, 200, 400, 800, 1600)
    Tables.table7(Jobs.session("table7"), sweep)
  }
}
