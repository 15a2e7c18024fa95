package repro.jobs

import repro.harness.Exhibits

/** spark-submit entrypoints, one per reproduced exhibit (DESIGN.md §3).
  *
  * `spark-submit --class repro.jobs.<Name> target/scala-2.13/repro_*.jar`
  * The LSM engine itself is driver-local; Spark is used by the query-side
  * jobs through the DataSourceV2 (`SparkReadDemoJob`). Scale via
  * BENCH_N_<DATASET> / BENCH_DIR env vars.
  */
object DatasetSummaryJob { // Table 1
  def main(args: Array[String]): Unit = Exhibits.table1()._2.foreach(println)
}

object StorageSizeJob { // Fig 12a
  def main(args: Array[String]): Unit = Exhibits.storage()._2.foreach(println)
}

object IngestionJob { // Fig 13a
  def main(args: Array[String]): Unit = Exhibits.ingestion()._2.foreach(println)
}

object QueryPerfJob { // Fig 14
  def main(args: Array[String]): Unit = Exhibits.queryPerf()._2.foreach(println)
}

object CodegenJob { // Fig 10
  def main(args: Array[String]): Unit = Exhibits.codegen()._2.foreach(println)
}

object SecondaryIndexJob { // Fig 15
  def main(args: Array[String]): Unit = Exhibits.secondaryIndex()._2.foreach(println)
}

object ColumnScalingJob { // Fig 16
  def main(args: Array[String]): Unit = Exhibits.columnScaling()._2.foreach(println)
}

/** Builds an AMAX dataset, then queries it through Spark SQL via the
  * DataSourceV2 with Catalyst whole-stage codegen on top.
  */
object SparkReadDemoJob {
  def main(args: Array[String]): Unit = {
    val spark = org.apache.spark.sql.SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("lsmcol-demo").getOrCreate()
    val built = repro.harness.Bench.insertOnly("sensors", repro.lsm.LayoutKind.Amax)
    built.ds.forceFullMerge()
    val df = spark.read.format("repro.sparkds.LsmColumnarSource")
      .load(built.ds.dir.getAbsolutePath)
    df.printSchema()
    df.createOrReplaceTempView("sensors")
    spark.sql(
      """SELECT sensor_id, MAX(r.temp) AS max_temp
        |FROM sensors LATERAL VIEW explode(readings) AS r
        |GROUP BY sensor_id ORDER BY max_temp DESC LIMIT 10""".stripMargin)
      .show(truncate = false)
    spark.stop()
  }
}
