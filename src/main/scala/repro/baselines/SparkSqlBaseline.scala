package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

/** The paper's Spark SQL / DataFrame baseline (§6.2, Fig. 3):
  * `spark.read.json` (which performs the schema-inference pass Rumble
  * avoids — the paper attributes Rumble's filter win to exactly this),
  * then a SQL string over a temp view.
  */
object SparkSqlBaseline {

  private def view(spark: SparkSession, path: String): DataFrame = {
    val df = spark.read.json(path)
    df.createOrReplaceTempView("dataset")
    df
  }

  def filterQuery(spark: SparkSession, path: String): Long = {
    view(spark, path)
    spark.sql("SELECT * FROM dataset WHERE guess = target").count()
  }

  def groupQuery(spark: SparkSession, path: String): Long = {
    view(spark, path)
    spark.sql("SELECT target, COUNT(*) AS cnt FROM dataset GROUP BY target").count()
  }

  def sortQuery(spark: SparkSession, path: String, out: String): Unit = {
    view(spark, path)
    spark.sql(
      "SELECT * FROM dataset WHERE guess = target " +
      "ORDER BY target ASC, country DESC, date DESC")
      .write.mode("overwrite").json(out)
  }

  def redditFilter(spark: SparkSession, path: String, minScore: Long): Long = {
    val df = spark.read.json(path)
    df.createOrReplaceTempView("reddit")
    spark.sql(s"SELECT * FROM reddit WHERE score >= $minScore").count()
  }
}
