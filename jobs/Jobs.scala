package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{LiteData, Tables}

/** spark-submit entrypoints, one per evaluation table:
  *
  * {{{
  *   spark-submit --class repro.jobs.Table3Job target/scala-2.13/repro_2.13-*.jar
  * }}}
  *
  * Each prints the same paper-style table as the corresponding bench suite.
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def run(name: String)(table: (SparkSession, LiteData) => (String, Seq[Tables.Row])): Unit = {
    val spark = session(name)
    try println(table(spark, new LiteData(spark))._1)
    finally spark.stop()
  }
}

/** Table 2: dataset statistics. */
object Table2Job {
  def main(args: Array[String]): Unit = Jobs.run("table2")(Tables.table2)
}

/** Table 3: PRG vs BFS baselines (Arabesque/RStream proxies). */
object Table3Job {
  def main(args: Array[String]): Unit = Jobs.run("table3")(Tables.table3(_, _))
}

/** Table 4: PRG vs DFS baseline (Fractal proxy). */
object Table4Job {
  def main(args: Array[String]): Unit = Jobs.run("table4")(Tables.table4(_, _))
}

/** Table 5: PRG vs task-oriented baseline (G-Miner proxy). */
object Table5Job {
  def main(args: Array[String]): Unit = Jobs.run("table5")(Tables.table5(_, _))
}

/** Table 6: constraint mining and existence queries. */
object Table6Job {
  def main(args: Array[String]): Unit = Jobs.run("table6")(Tables.table6(_, _))
}

/** Fig 10: symmetry breaking on/off (PRG vs PRG-U). */
object Fig10Job {
  def main(args: Array[String]): Unit = Jobs.run("fig10")(Tables.fig10(_, _))
}

/** Fig 1: baseline exploration profiles. */
object Fig1ProfileJob {
  def main(args: Array[String]): Unit = Jobs.run("fig1")(Tables.fig1(_, _))
}
