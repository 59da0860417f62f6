package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.queries.{Q, Tables, TpchData}

/** Runs a query's shared SQL body through Spark itself (Catalyst + the
  * whole DataFrame/SQL stack) over the same ingested tables the engine
  * sees. Used as the real-SparkSQL correctness baseline: its results are
  * oracle-checked against DuckDB and diffed against the engine's.
  */
object SparkSqlRunner {
  def run(spark: SparkSession, t: Tables, q: Q): DataFrame = {
    q.tables.foreach { n =>
      TpchData.df(spark, t, n).createOrReplaceTempView(n + "_raw")
    }
    spark.sql(q.sparkSql)
  }
}
