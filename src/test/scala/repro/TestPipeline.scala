package repro

import org.apache.spark.sql.SparkSession

import repro.pipeline.Pipeline

/** Shared small-scale pipeline instance for the unit-test JVM. */
object TestPipeline {
  val Scale = 0.03

  def get(spark: SparkSession): Pipeline = Pipeline.get(spark, Scale)
}
