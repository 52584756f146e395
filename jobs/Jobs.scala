package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.{Datasets, Tables}

/** Shared session bootstrap for the spark-submit entrypoints. */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Table I: dataset summary (|E|, |U|, |L|, delta, alpha_max, beta_max, |R_dd|). */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-i")
    println(Tables.printTableI(Tables.tableI(spark)))
    spark.stop()
  }
}

/** Table II: query-result statistics across community models. */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-ii")
    println(Tables.printTableII(Tables.tableII(spark)))
    spark.stop()
  }
}

/** Table III: SCS running time under weight distributions AE/RW/UF/SK. */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-iii")
    println(Tables.printTableIII(Tables.tableIII(spark)))
    spark.stop()
  }
}

/** Fig 8 (as table): Q_o vs Q_v vs Q_opt community retrieval time. */
object QueryTimeJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("query-time")
    println(Tables.printQueryTimeTable(Tables.queryTimeTable(spark, Datasets.small)))
    spark.stop()
  }
}

/** Fig 10/11 (as table): index construction time and size. */
object IndexBuildJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("index-build")
    println(Tables.printIndexTable(Tables.indexTable(spark, Datasets.small)))
    spark.stop()
  }
}

/** Fig 12 (as table): SCS-Baseline vs SCS-Peel vs SCS-Expand across datasets. */
object ScsTimeJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("scs-time")
    println(Tables.printScsTable(Tables.scsTable(spark, Datasets.small)))
    spark.stop()
  }
}
