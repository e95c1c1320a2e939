package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench._
import repro.nlp.CorpusGen

/** Shared SparkSession factory for spark-submit entry points. */
object JobSpark {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def envLong(k: String, d: Long): Long = sys.env.get(k).map(_.toLong).getOrElse(d)
  def envInt(k: String, d: Int): Int = sys.env.get(k).map(_.toInt).getOrElse(d)
}

/** Table 1 (GSP vs noGSP): `spark-submit --class repro.jobs.Table1Job`. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("koko-table1")
    val nHappy = JobSpark.envLong("T1_HAPPY", 2000)
    val nWiki = JobSpark.envLong("T1_WIKI", 400)
    val happy = CorpusGen.corpus(spark, "happy", nHappy).collect().toSeq
    val wiki = CorpusGen.corpus(spark, "wiki", nWiki).collect().toSeq
    val rows = Table1Harness.run(
      Seq("HappyDB" -> happy, "Wikipedia" -> wiki),
      nQueries = JobSpark.envInt("T1_QUERIES", 10),
      sentsPerQuery = JobSpark.envInt("T1_SENTS", 100),
      seed = 42)
    println(Table1Harness.render(rows))
    spark.stop()
  }
}

/** Table 2 (scaling breakdown): `--class repro.jobs.Table2Job`. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("koko-table2")
    val sizes = sys.env.getOrElse("T2_SIZES", "200,1000,5000,20000")
      .split(",").toIndexedSeq.map(_.trim.toLong)
    val rows = Table2Harness.run(spark, sizes)
    println(Table2Harness.render(rows))
    spark.stop()
  }
}

/** Index comparison (Fig 6–8 analog): `--class repro.jobs.IndexCompareJob`. */
object IndexCompareJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("koko-indexcmp")
    val (b, l) = IndexCompareHarness.run(
      spark,
      nDocs = JobSpark.envLong("IC_DOCS", 20000),
      perSetting = JobSpark.envInt("IC_PER_SETTING", 1),
      tmpDir = sys.env.getOrElse("IC_TMP", "/tmp/koko-indexcmp"))
    println(IndexCompareHarness.render(b, l))
    spark.stop()
  }
}

/** Cafe-extraction quality (Fig 3/5 analog): `--class repro.jobs.QualityJob`. */
object QualityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("koko-quality")
    val rows = QualityHarness.run(
      spark,
      nDocs = JobSpark.envLong("Q_DOCS", 300),
      thresholds = Seq(0.2, 0.4, 0.6, 0.8, 0.9))
    println(QualityHarness.render(rows))
    spark.stop()
  }
}
