package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.tables._
import repro.data.DatasetSpec
import repro.embed.ClipSim

/** Shared spark-submit bootstrap for the table jobs. */
object JobSession {
  def create(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def sfArg(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(BenchDefaults.sf)
}

/** Runs the one-time preprocessing pipeline (paper §2.4) for each corpus and
  * writes the patch-vector tables as Parquet under the given output dir.
  * Usage: PreprocessJob [outDir] [sf]
  */
object PreprocessJob {
  def main(args: Array[String]): Unit = {
    val out = args.headOption.getOrElse("/tmp/seesaw-vectors")
    val sf = args.lift(1).map(_.toDouble).getOrElse(BenchDefaults.sf)
    val spark = JobSession.create("seesaw-preprocess")
    try {
      DatasetSpec.all(BenchDefaults.dim).foreach { spec =>
        val df = ClipSim.patchVectors(spark, spec, sf, multiscale = true)
        df.write.mode("overwrite").parquet(s"$out/${spec.name.toLowerCase}")
        println(s"[preprocess] ${spec.name}: ${df.count()} patch vectors -> $out/${spec.name.toLowerCase}")
      }
    } finally spark.stop()
  }
}

/** Table 2: SeeSaw optimization ladder. Usage: Table2Job [sf] */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("seesaw-table2")
    try {
      println(Table2.renderPaper)
      println(Table2.compute(spark, JobSession.sfArg(args)).render)
    } finally spark.stop()
  }
}

/** Table 3: baseline comparison (no multiscale). Usage: Table3Job [sf] */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("seesaw-table3")
    try {
      println(Table3.renderPaper)
      println(Table3.compute(spark, JobSession.sfArg(args)).render)
    } finally spark.stop()
  }
}

/** Table 4: ENS horizon/calibration sensitivity. Usage: Table4Job [sf] */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("seesaw-table4")
    try {
      println(Table4.PaperKnown)
      println(Table4.compute(spark, JobSession.sfArg(args)).render)
    } finally spark.stop()
  }
}

/** Table 5: simulated annotation timing. Usage: Table5Job [sf] */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("seesaw-table5")
    try {
      println(Table5.PaperCells)
      println(Table5.compute(spark, JobSession.sfArg(args)).render)
    } finally spark.stop()
  }
}

/** Table 6: per-iteration latency vs database size. Usage: Table6Job [scale] */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("seesaw-table6")
    try {
      println(Table6.Paper)
      val scale = args.headOption.map(_.toDouble).getOrElse(BenchDefaults.t6Scale)
      println(Table6.compute(spark, scale = scale).render)
    } finally spark.stop()
  }
}

/** Table 7: hyperparameter sweep. Usage: Table7Job [sf] */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("seesaw-table7")
    try {
      println(Table7.renderPaper)
      println(Table7.compute(spark, JobSession.sfArg(args)).render)
    } finally spark.stop()
  }
}
