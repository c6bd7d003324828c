package repro.ingest

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Data Source Importers (§2.2): read upstream data artifacts in their raw
  * format and convert them into a standard row-based dataset, normalizing
  * the heterogeneity of upstream data for the rest of the pipeline.
  *
  * Saga provides "importer templates that can be altered to develop custom
  * source ingestion pipelines" — these are the templates: CSV, JSON(-lines),
  * Parquet, and in-memory (for payloads already produced upstream).
  */
trait DataSourceImporter extends Serializable {
  /** Name of the artifact this importer produces (sources may combine
    * several artifacts, e.g. raw artist info + artist popularity).
    */
  def artifact: String

  /** Read the upstream data into a uniform row-based DataFrame. */
  def importRows(spark: SparkSession): DataFrame
}

/** CSV artifact with a header row; all columns land as strings unless
  * `inferSchema` is set.
  */
final case class CsvImporter(artifact: String, path: String,
                             inferSchema: Boolean = false) extends DataSourceImporter {
  def importRows(spark: SparkSession): DataFrame =
    spark.read.option("header", "true").option("inferSchema", inferSchema.toString).csv(path)
}

/** JSON-lines artifact. */
final case class JsonImporter(artifact: String, path: String) extends DataSourceImporter {
  def importRows(spark: SparkSession): DataFrame = spark.read.json(path)
}

/** Parquet artifact (the common HDFS hand-off format in the paper). */
final case class ParquetImporter(artifact: String, path: String) extends DataSourceImporter {
  def importRows(spark: SparkSession): DataFrame = spark.read.parquet(path)
}

/** An artifact that is already a DataFrame — used when an upstream provider
  * publishes through the platform itself, and by every test.
  */
final case class InMemoryImporter(artifact: String, df: DataFrame) extends DataSourceImporter {
  def importRows(spark: SparkSession): DataFrame = df
}
