package repro

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** Test helper: builds scored/labeled pair frames in the repo pair schema. */
object TestPairs {

  /** (id1, id2, groupsLeft, groupsRight, label, score). */
  def scored(spark: SparkSession,
             rows: Seq[(Long, Long, Seq[String], Seq[String], Int, Double)]): DataFrame = {
    val schema = StructType(Seq(
      StructField("id1", LongType), StructField("id2", LongType),
      StructField("g1", ArrayType(StringType)), StructField("g2", ArrayType(StringType)),
      StructField("label", IntegerType), StructField("score", DoubleType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => Row(r._1, r._2, r._3, r._4, r._5, r._6)), 2),
      schema)
  }

  /** Appendix B / Figure 15 worked example, scores encode the decisions h. */
  def appendixB(spark: SparkSession): DataFrame = scored(spark, Seq(
    (1L, 2L, Seq("g1"), Seq("g1"), 0, 1.0), // h=M y=N -> FP
    (3L, 4L, Seq("g2"), Seq("g1"), 0, 0.0), // h=N y=N -> TN
    (1L, 4L, Seq("g1"), Seq("g1"), 1, 1.0), // h=M y=M -> TP
    (2L, 3L, Seq("g1"), Seq("g2"), 1, 0.0), // h=N y=M -> FN
  ))
}
