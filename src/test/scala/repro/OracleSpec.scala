package repro

import org.apache.spark.sql.functions._
import repro.data.{DatasetProfile, ERGen}

/** DuckDB-oracle checks over the relational parts of the pipeline: the
  * generated dataset's aggregations must agree between Spark SQL and
  * DuckDB — a wrong generator column or broken aggregation is caught by
  * result equality, not just "it ran".
  */
class OracleSpec extends SparkSpec {

  private lazy val mini = DatasetProfile.mini(DatasetProfile.citeseer, 200)
  private lazy val df = ERGen.generate(spark, mini)
    .select(col("id").cast("string").as("id"),
            col("entity_id").cast("string").as("entity_id"),
            col("text"))
    .cache()

  test("records-per-entity histogram agrees with DuckDB") {
    val agg = df.groupBy("entity_id").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      agg, "SELECT entity_id, COUNT(*) AS n FROM recs GROUP BY entity_id",
      "recs" -> df)
  }

  test("total record count agrees with DuckDB") {
    val agg = df.agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(agg, "SELECT COUNT(*) AS n FROM recs", "recs" -> df)
  }

  test("distinct entity count agrees with DuckDB") {
    val agg = df.agg(countDistinct(col("entity_id")).as("n_ent"))
    Oracle.assertEquivalent(
      agg, "SELECT COUNT(DISTINCT entity_id) AS n_ent FROM recs", "recs" -> df)
  }

  test("text length statistics agree with DuckDB") {
    val agg = df.groupBy("entity_id")
      .agg(sum(length(col("text"))).cast("long").as("total_len"))
    Oracle.assertEquivalent(
      agg,
      "SELECT entity_id, SUM(LENGTH(text)) AS total_len FROM recs GROUP BY entity_id",
      "recs" -> df)
  }

  test("entity size distribution (group-of-groups) agrees with DuckDB") {
    val sizes = df.groupBy("entity_id").agg(count(lit(1)).as("sz"))
    val hist  = sizes.groupBy("sz").agg(count(lit(1)).as("n_entities"))
    Oracle.assertEquivalent(
      hist,
      """SELECT sz, COUNT(*) AS n_entities FROM
         (SELECT entity_id, COUNT(*) AS sz FROM recs GROUP BY entity_id)
         GROUP BY sz""",
      "recs" -> df)
  }
}
