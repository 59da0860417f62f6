package repro

import org.apache.spark.sql.DataFrame
import repro.core.Rows.R

/** Shared helpers for result comparison without the DuckDB oracle
  * (engine-vs-engine and engine-vs-Spark diffs).
  */
object TestUtil {
  private def fmt(v: Any): String = v match {
    case d: Double                => f"$d%.6f"
    case f: Float                 => f"${f.toDouble}%.6f"
    case b: java.math.BigDecimal  => f"${b.doubleValue}%.6f"
    case b: BigDecimal            => f"${b.doubleValue}%.6f"
    case null                     => "∅"
    case x                        => x.toString
  }

  /** Order-insensitive canonical form of a result multiset. */
  def canon(rows: Seq[R]): Vector[String] =
    rows.map(_.map(fmt).mkString("|")).toVector.sorted

  def canonDf(df: DataFrame): Vector[String] =
    canon(df.collect().toSeq.map(_.toSeq.toArray))

  def assertSameRows(a: Seq[R], b: Seq[R], what: String): Unit = {
    val (ca, cb) = (canon(a), canon(b))
    assert(ca == cb,
      s"$what differ: ${ca.size} vs ${cb.size} rows; " +
      s"first-only-left=${ca.diff(cb).take(3)} first-only-right=${cb.diff(ca).take(3)}")
  }
}
