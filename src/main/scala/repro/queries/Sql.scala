package repro.queries

/** Shared SQL-generation for the DuckDB oracle and the SparkSQL baseline.
  *
  * Both backends see the same base tables under `<table>_raw` (DuckDB: all
  * VARCHAR, loaded by [[repro.Oracle]]; Spark: typed temp views). A typed
  * CTE per table casts every column to an exact type — money to DECIMAL so
  * aggregate arithmetic is exact fixed point in both systems and matches
  * the engine's scaled-Long arithmetic bit for bit; dates stay ISO text
  * (lexicographic order == date order). Query bodies are written once
  * against the CTEs and work in both dialects.
  */
object Sql {
  sealed trait SqlT
  case object TBigint extends SqlT
  final case class TDecimal(p: Int, s: Int) extends SqlT
  case object TText extends SqlT

  sealed trait Dialect { def text: String }
  case object Duck extends Dialect { val text = "VARCHAR" }
  case object SparkD extends Dialect { val text = "STRING" }

  private def money = TDecimal(12, 2)
  private def pct = TDecimal(4, 2)

  /** Exact SQL types per table column (see DESIGN.md §4). */
  val tableTypes: Map[String, Vector[(String, SqlT)]] = Map(
    "lineitem" -> Vector(
      "l_orderkey" -> TBigint, "l_partkey" -> TBigint, "l_suppkey" -> TBigint,
      "l_linenumber" -> TBigint, "l_quantity" -> money, "l_extendedprice" -> money,
      "l_discount" -> pct, "l_tax" -> pct, "l_returnflag" -> TText,
      "l_linestatus" -> TText, "l_shipdate" -> TText, "l_shipmode" -> TText,
      "l_commitdate" -> TText, "l_receiptdate" -> TText),
    "orders" -> Vector(
      "o_orderkey" -> TBigint, "o_custkey" -> TBigint, "o_orderstatus" -> TText,
      "o_totalprice" -> money, "o_orderdate" -> TText, "o_orderpriority" -> TText),
    "customer" -> Vector(
      "c_custkey" -> TBigint, "c_nationkey" -> TBigint, "c_acctbal" -> money,
      "c_mktsegment" -> TText),
    "part" -> Vector(
      "p_partkey" -> TBigint, "p_type" -> TText, "p_size" -> TBigint,
      "p_retailprice" -> money),
    "supplier" -> Vector(
      "s_suppkey" -> TBigint, "s_nationkey" -> TBigint, "s_acctbal" -> money),
    "partsupp" -> Vector(
      "ps_partkey" -> TBigint, "ps_suppkey" -> TBigint, "ps_supplycost" -> money,
      "ps_availqty" -> TBigint),
    "nation" -> Vector(
      "n_nationkey" -> TBigint, "n_name" -> TText, "n_regionkey" -> TBigint),
    "region" -> Vector(
      "r_regionkey" -> TBigint, "r_name" -> TText),
  )

  private def typeName(t: SqlT, d: Dialect): String = t match {
    case TBigint        => "BIGINT"
    case TDecimal(p, s) => s"DECIMAL($p,$s)"
    case TText          => d.text
  }

  private def cte(table: String, d: Dialect): String = {
    val cols = tableTypes(table).map { case (c, t) =>
      s"CAST($c AS ${typeName(t, d)}) AS $c"
    }
    s"$table AS (SELECT ${cols.mkString(", ")} FROM ${table}_raw)"
  }

  /** Full query text for `body` over typed CTEs of `tables` in dialect `d`. */
  def render(tables: Seq[String], body: String, d: Dialect): String =
    s"WITH ${tables.map(cte(_, d)).mkString(",\n     ")}\n$body"
}
