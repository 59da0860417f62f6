package repro.queries

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData
import repro.core._
import repro.core.Rows.{R, dbl, lng, str, year}
import scala.collection.mutable

/** All ingested tables of one scale factor. */
final case class Tables(sch: Map[String, Sch], rows: Map[String, Array[R]]) {
  def idx(table: String, col: String): Int = sch(table).idx(col)
}

/** Loads and caches the TPC-H-lite tables as engine rows. The DuckDB oracle
  * and the SparkSQL baseline are fed from the *same* ingested rows (via
  * [[Rows.toDf]]) so all three systems see identical inputs.
  */
object TpchData {
  val names: Vector[String] = Vector(
    "lineitem", "orders", "customer", "part", "supplier", "partsupp", "nation", "region")

  private val cache = mutable.Map.empty[Double, Tables]

  def load(spark: SparkSession, sf: Double): Tables = synchronized {
    cache.getOrElseUpdate(sf, {
      val dfs = Map[String, DataFrame](
        "lineitem" -> SynthData.lineitem(spark, sf),
        "orders"   -> SynthData.orders(spark, sf),
        "customer" -> SynthData.customer(spark, sf),
        "part"     -> SynthData.part(spark, sf),
        "supplier" -> SynthData.supplier(spark, sf),
        "partsupp" -> SynthData.partsupp(spark, sf),
        "nation"   -> SynthData.nation(spark),
        "region"   -> SynthData.region(spark),
      )
      val ingested = dfs.map { case (n, df) => n -> Rows.ingest(df) }
      Tables(ingested.map { case (n, (s, _)) => n -> s },
             ingested.map { case (n, (_, r)) => n -> r })
    })
  }

  /** Rebuild a table as a Spark DataFrame from the ingested rows. */
  def df(spark: SparkSession, t: Tables, name: String): DataFrame =
    Rows.toDf(spark, t.sch(name), t.rows(name).toSeq)
}

/** One TPC-H-lite query: paper category, engine plan, shared SQL body. */
final case class Q(
  id: String,
  cat: String, // "I" (simple agg), "II" (simple joins), "III" (multi-join), "-" (extra)
  tables: Vector[String],
  body: String,
  mkPlan: Tables => Plan,
) {
  def duckSql: String = Sql.render(tables, body, Sql.Duck)
  def sparkSql: String = Sql.render(tables, body, Sql.SparkD)
}

/** The 11 TPC-H-lite queries (DESIGN.md §4). Literal substitutions onto the
  * synthetic domain are noted per query; join trees, filters and aggregate
  * structure follow the TPC-H originals, with ORDER BY/LIMIT dropped
  * (results are compared as sorted multisets).
  */
object TpchLite {
  import Money.{c2, charge6, rev4}

  private def S(cols: (String, ColType)*): Sch = Sch.of(cols: _*)

  private def filterProject(f: R => Boolean, p: R => R): Array[R] => Array[R] =
    batch => {
      val out = mutable.ArrayBuffer.empty[R]
      var i = 0
      while (i < batch.length) { val r = batch(i); if (f(r)) out += p(r); i += 1 }
      out.toArray
    }

  /** Simple sum-aggregation stage: group by `keyIdx` columns, sum the Long
    * columns `accIdx`.
    */
  private def sumAgg(b: PlanBuilder, up: Int, keyIdx: Vector[Int], accIdx: Vector[Int],
                     out: Sch)(finish: (Vector[Any], Array[Long]) => R): Int =
    b.agg(up,
      key = r => keyIdx.map(r(_)),
      keyOut = r => keyIdx.map(r(_)),
      nAccs = accIdx.size, out) { (accs, r) =>
        var i = 0
        while (i < accIdx.size) { accs(i) += lng(r, accIdx(i)); i += 1 }
      }(finish)

  // ------------------------------------------------------------------- Q1

  val q1: Q = Q("q1", "I", Vector("lineitem"),
    body = """SELECT l_returnflag, l_linestatus,
      | CAST(SUM(l_quantity) AS DOUBLE) AS sum_qty,
      | CAST(SUM(l_extendedprice) AS DOUBLE) AS sum_base_price,
      | CAST(SUM(l_extendedprice * (1 - l_discount)) AS DOUBLE) AS sum_disc_price,
      | CAST(SUM(l_extendedprice * (1 - l_discount) * (1 + l_tax)) AS DOUBLE) AS sum_charge,
      | CAST(SUM(l_quantity) AS DOUBLE) / COUNT(*) AS avg_qty,
      | CAST(SUM(l_extendedprice) AS DOUBLE) / COUNT(*) AS avg_price,
      | CAST(SUM(l_discount) AS DOUBLE) / COUNT(*) AS avg_disc,
      | CAST(COUNT(*) AS BIGINT) AS count_order
      |FROM lineitem
      |WHERE l_shipdate <= '1998-09-02'
      |GROUP BY l_returnflag, l_linestatus""".stripMargin,
    mkPlan = { t =>
      val L = t.sch("lineitem")
      val (ship, rf, ls) = (L.idx("l_shipdate"), L.idx("l_returnflag"), L.idx("l_linestatus"))
      val (qty, price, disc, tax) =
        (L.idx("l_quantity"), L.idx("l_extendedprice"), L.idx("l_discount"), L.idx("l_tax"))
      val partial = S("rf" -> CString, "ls" -> CString, "qty" -> CLong, "base" -> CLong,
        "dp" -> CLong, "chg" -> CLong, "disc" -> CLong, "cnt" -> CLong)
      val b = new PlanBuilder("q1")
      // scan-side pre-aggregation ("aggregation pushdown", paper §V-C)
      val scan = b.input("lineitem", partial) { batch =>
        val m = mutable.LinkedHashMap.empty[(String, String), Array[Long]]
        batch.foreach { r =>
          if (str(r, ship) <= "1998-09-02") {
            val a = m.getOrElseUpdate((str(r, rf), str(r, ls)), new Array[Long](6))
            a(0) += math.round(dbl(r, qty)); a(1) += c2(dbl(r, price))
            a(2) += rev4(dbl(r, price), dbl(r, disc))
            a(3) += charge6(dbl(r, price), dbl(r, disc), dbl(r, tax))
            a(4) += c2(dbl(r, disc)); a(5) += 1
          }
        }
        m.iterator.map { case ((a, b2), s) =>
          Array[Any](a, b2, s(0), s(1), s(2), s(3), s(4), s(5))
        }.toArray
      }
      val out = S("l_returnflag" -> CString, "l_linestatus" -> CString,
        "sum_qty" -> CDouble, "sum_base_price" -> CDouble, "sum_disc_price" -> CDouble,
        "sum_charge" -> CDouble, "avg_qty" -> CDouble, "avg_price" -> CDouble,
        "avg_disc" -> CDouble, "count_order" -> CLong)
      sumAgg(b, scan, Vector(0, 1), Vector(2, 3, 4, 5, 6, 7), out) { (k, a) =>
        val cnt = a(5)
        Array[Any](k(0), k(1), a(0).toDouble, a(1).toDouble / 100.0, a(2).toDouble / 1e4,
          a(3).toDouble / 1e6, a(0).toDouble / cnt, a(1).toDouble / 100.0 / cnt,
          a(4).toDouble / 100.0 / cnt, cnt)
      }
      b.build()
    })

  // ------------------------------------------------------------------- Q6

  val q6: Q = Q("q6", "I", Vector("lineitem"),
    body = """SELECT CAST(COALESCE(SUM(l_extendedprice * l_discount), 0) AS DOUBLE) AS revenue
      |FROM lineitem
      |WHERE l_shipdate >= '1994-01-01' AND l_shipdate < '1995-01-01'
      | AND l_discount BETWEEN 0.05 AND 0.07 AND l_quantity < 24""".stripMargin,
    mkPlan = { t =>
      val L = t.sch("lineitem")
      val (ship, qty, price, disc) =
        (L.idx("l_shipdate"), L.idx("l_quantity"), L.idx("l_extendedprice"), L.idx("l_discount"))
      val b = new PlanBuilder("q6")
      // pre-aggregated scan: one partial row per batch (sum may be 0, so the
      // single global group always exists — matching SQL's COALESCE(...,0))
      val scan = b.input("lineitem", S("rev" -> CLong)) { batch =>
        var s = 0L
        batch.foreach { r =>
          val dc = c2(dbl(r, disc))
          if (str(r, ship) >= "1994-01-01" && str(r, ship) < "1995-01-01" &&
              dc >= 5 && dc <= 7 && dbl(r, qty) < 24)
            s += c2(dbl(r, price)) * dc
        }
        Array(Array[Any](s))
      }
      sumAgg(b, scan, Vector(), Vector(0), S("revenue" -> CDouble)) { (_, a) =>
        Array[Any](a(0).toDouble / 1e4)
      }
      b.build()
    })

  // ------------------------------------------------------------------- Q3

  val q3: Q = Q("q3", "II", Vector("customer", "orders", "lineitem"),
    body = """SELECT l_orderkey, o_orderdate,
      | CAST(SUM(l_extendedprice * (1 - l_discount)) AS DOUBLE) AS revenue
      |FROM customer, orders, lineitem
      |WHERE c_mktsegment = 'BUILDING' AND c_custkey = o_custkey AND l_orderkey = o_orderkey
      | AND o_orderdate < '1995-03-15' AND l_shipdate > '1995-03-15'
      |GROUP BY l_orderkey, o_orderdate""".stripMargin,
    mkPlan = { t =>
      val Cu = t.sch("customer"); val O = t.sch("orders"); val L = t.sch("lineitem")
      val b = new PlanBuilder("q3")
      val cu = b.input("customer", S("c_custkey" -> CLong))(filterProject(
        r => str(r, Cu.idx("c_mktsegment")) == "BUILDING",
        r => Array[Any](lng(r, Cu.idx("c_custkey")))))
      val od = b.input("orders", S("o_orderkey" -> CLong, "o_custkey" -> CLong, "o_orderdate" -> CString))(
        filterProject(
          r => str(r, O.idx("o_orderdate")) < "1995-03-15",
          r => Array[Any](lng(r, O.idx("o_orderkey")), lng(r, O.idx("o_custkey")),
            str(r, O.idx("o_orderdate")))))
      val j1 = b.join(cu, od, r => lng(r, 0), r => lng(r, 1),
        S("o_orderkey" -> CLong, "o_orderdate" -> CString)) { (_, o) =>
        Array[Any](lng(o, 0), str(o, 2))
      }
      val li = b.input("lineitem", S("l_orderkey" -> CLong, "rev" -> CLong))(filterProject(
        r => str(r, L.idx("l_shipdate")) > "1995-03-15",
        r => Array[Any](lng(r, L.idx("l_orderkey")),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val j2 = b.join(j1, li, r => lng(r, 0), r => lng(r, 0),
        S("l_orderkey" -> CLong, "o_orderdate" -> CString, "rev" -> CLong)) { (a, l) =>
        Array[Any](lng(l, 0), str(a, 1), lng(l, 1))
      }
      sumAgg(b, j2, Vector(0, 1), Vector(2),
        S("l_orderkey" -> CLong, "o_orderdate" -> CString, "revenue" -> CDouble)) { (k, a) =>
        Array[Any](k(0), k(1), a(0).toDouble / 1e4)
      }
      b.build()
    })

  // ------------------------------------------------------------------ Q10

  val q10: Q = Q("q10", "II", Vector("customer", "orders", "lineitem", "nation"),
    body = """SELECT c_custkey, n_name, c_acctbal,
      | CAST(SUM(l_extendedprice * (1 - l_discount)) AS DOUBLE) AS revenue
      |FROM customer, orders, lineitem, nation
      |WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
      | AND o_orderdate >= '1993-10-01' AND o_orderdate < '1994-01-01'
      | AND l_returnflag = 'R' AND c_nationkey = n_nationkey
      |GROUP BY c_custkey, n_name, c_acctbal""".stripMargin,
    mkPlan = { t =>
      val Cu = t.sch("customer"); val O = t.sch("orders")
      val L = t.sch("lineitem"); val N = t.sch("nation")
      val b = new PlanBuilder("q10")
      val li = b.input("lineitem", S("l_orderkey" -> CLong, "rev" -> CLong))(filterProject(
        r => str(r, L.idx("l_returnflag")) == "R",
        r => Array[Any](lng(r, L.idx("l_orderkey")),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val od = b.input("orders", S("o_orderkey" -> CLong, "o_custkey" -> CLong))(filterProject(
        r => { val d = str(r, O.idx("o_orderdate")); d >= "1993-10-01" && d < "1994-01-01" },
        r => Array[Any](lng(r, O.idx("o_orderkey")), lng(r, O.idx("o_custkey")))))
      val j1 = b.join(od, li, r => lng(r, 0), r => lng(r, 0),
        S("o_custkey" -> CLong, "rev" -> CLong)) { (o, l) =>
        Array[Any](lng(o, 1), lng(l, 1))
      }
      val cu = b.input("customer", S("c_custkey" -> CLong, "c_nationkey" -> CLong, "c_acctbal" -> CDouble))(
        filterProject(_ => true, r => Array[Any](lng(r, Cu.idx("c_custkey")),
          lng(r, Cu.idx("c_nationkey")), dbl(r, Cu.idx("c_acctbal")))))
      val j2 = b.join(j1, cu, r => lng(r, 0), r => lng(r, 0),
        S("c_custkey" -> CLong, "c_nationkey" -> CLong, "c_acctbal" -> CDouble, "rev" -> CLong)) {
        (a, c) => Array[Any](lng(c, 0), lng(c, 1), dbl(c, 2), lng(a, 1))
      }
      val na = b.input("nation", S("n_nationkey" -> CLong, "n_name" -> CString))(
        filterProject(_ => true,
          r => Array[Any](lng(r, N.idx("n_nationkey")), str(r, N.idx("n_name")))))
      val j3 = b.join(j2, na, r => lng(r, 1), r => lng(r, 0),
        S("c_custkey" -> CLong, "n_name" -> CString, "c_acctbal" -> CDouble, "rev" -> CLong)) {
        (a, n) => Array[Any](lng(a, 0), str(n, 1), dbl(a, 2), lng(a, 3))
      }
      sumAgg(b, j3, Vector(0, 1, 2), Vector(3),
        S("c_custkey" -> CLong, "n_name" -> CString, "c_acctbal" -> CDouble, "revenue" -> CDouble)) {
        (k, a) => Array[Any](k(0), k(1), k(2), a(0).toDouble / 1e4)
      }
      b.build()
    })

  // ------------------------------------------------------------------- Q5

  val q5: Q = Q("q5", "III",
    Vector("customer", "orders", "lineitem", "supplier", "nation", "region"),
    body = """SELECT n_name, CAST(SUM(l_extendedprice * (1 - l_discount)) AS DOUBLE) AS revenue
      |FROM customer, orders, lineitem, supplier, nation, region
      |WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey AND l_suppkey = s_suppkey
      | AND c_nationkey = s_nationkey AND s_nationkey = n_nationkey AND n_regionkey = r_regionkey
      | AND r_name = 'REGION_2' AND o_orderdate >= '1994-01-01' AND o_orderdate < '1995-01-01'
      |GROUP BY n_name""".stripMargin,
    mkPlan = { t =>
      val Cu = t.sch("customer"); val O = t.sch("orders"); val L = t.sch("lineitem")
      val Su = t.sch("supplier"); val N = t.sch("nation"); val Re = t.sch("region")
      val b = new PlanBuilder("q5")
      val re = b.input("region", S("r_regionkey" -> CLong))(filterProject(
        r => str(r, Re.idx("r_name")) == "REGION_2",
        r => Array[Any](lng(r, Re.idx("r_regionkey")))))
      val na = b.input("nation", S("n_nationkey" -> CLong, "n_name" -> CString, "n_regionkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, N.idx("n_nationkey")),
          str(r, N.idx("n_name")), lng(r, N.idx("n_regionkey")))))
      val j1 = b.join(re, na, r => lng(r, 0), r => lng(r, 2),
        S("n_nationkey" -> CLong, "n_name" -> CString)) { (_, n) =>
        Array[Any](lng(n, 0), str(n, 1))
      }
      val cu = b.input("customer", S("c_custkey" -> CLong, "c_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Cu.idx("c_custkey")),
          lng(r, Cu.idx("c_nationkey")))))
      val j2 = b.join(j1, cu, r => lng(r, 0), r => lng(r, 1),
        S("c_custkey" -> CLong, "n_nationkey" -> CLong, "n_name" -> CString)) { (n, c) =>
        Array[Any](lng(c, 0), lng(n, 0), str(n, 1))
      }
      val od = b.input("orders", S("o_orderkey" -> CLong, "o_custkey" -> CLong))(filterProject(
        r => { val d = str(r, O.idx("o_orderdate")); d >= "1994-01-01" && d < "1995-01-01" },
        r => Array[Any](lng(r, O.idx("o_orderkey")), lng(r, O.idx("o_custkey")))))
      val j3 = b.join(j2, od, r => lng(r, 0), r => lng(r, 1),
        S("o_orderkey" -> CLong, "n_nationkey" -> CLong, "n_name" -> CString)) { (a, o) =>
        Array[Any](lng(o, 0), lng(a, 1), str(a, 2))
      }
      val li = b.input("lineitem", S("l_orderkey" -> CLong, "l_suppkey" -> CLong, "rev" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, L.idx("l_orderkey")),
          lng(r, L.idx("l_suppkey")),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val j4 = b.join(j3, li, r => lng(r, 0), r => lng(r, 0),
        S("l_suppkey" -> CLong, "n_nationkey" -> CLong, "n_name" -> CString, "rev" -> CLong)) {
        (a, l) => Array[Any](lng(l, 1), lng(a, 1), str(a, 2), lng(l, 2))
      }
      val su = b.input("supplier", S("s_suppkey" -> CLong, "s_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Su.idx("s_suppkey")),
          lng(r, Su.idx("s_nationkey")))))
      val j5 = b.join(j4, su, r => lng(r, 0), r => lng(r, 0),
        S("n_name" -> CString, "rev" -> CLong)) { (a, s) =>
        if (lng(a, 1) == lng(s, 1)) Array[Any](str(a, 2), lng(a, 3)) else null
      }
      sumAgg(b, j5, Vector(0), Vector(1), S("n_name" -> CString, "revenue" -> CDouble)) {
        (k, a) => Array[Any](k(0), a(0).toDouble / 1e4)
      }
      b.build()
    })

  // ------------------------------------------------------------------- Q7

  val q7: Q = Q("q7", "III",
    Vector("supplier", "lineitem", "orders", "customer", "nation"),
    body = """SELECT supp_nation, cust_nation, l_year, CAST(SUM(volume) AS DOUBLE) AS revenue
      |FROM (SELECT n1.n_name AS supp_nation, n2.n_name AS cust_nation,
      |       CAST(SUBSTR(l_shipdate, 1, 4) AS BIGINT) AS l_year,
      |       l_extendedprice * (1 - l_discount) AS volume
      |      FROM supplier, lineitem, orders, customer, nation n1, nation n2
      |      WHERE s_suppkey = l_suppkey AND o_orderkey = l_orderkey AND c_custkey = o_custkey
      |       AND s_nationkey = n1.n_nationkey AND c_nationkey = n2.n_nationkey
      |       AND ((n1.n_name = 'NATION_07' AND n2.n_name = 'NATION_08')
      |         OR (n1.n_name = 'NATION_08' AND n2.n_name = 'NATION_07'))
      |       AND l_shipdate BETWEEN '1995-01-01' AND '1996-12-31') shipping
      |GROUP BY supp_nation, cust_nation, l_year""".stripMargin,
    mkPlan = { t =>
      val Su = t.sch("supplier"); val L = t.sch("lineitem"); val O = t.sch("orders")
      val Cu = t.sch("customer"); val N = t.sch("nation")
      val NA = "NATION_07"; val NB = "NATION_08"
      val b = new PlanBuilder("q7")
      val n1 = b.input("nation", S("n_nationkey" -> CLong, "n_name" -> CString))(filterProject(
        r => { val n = str(r, N.idx("n_name")); n == NA || n == NB },
        r => Array[Any](lng(r, N.idx("n_nationkey")), str(r, N.idx("n_name")))))
      val su = b.input("supplier", S("s_suppkey" -> CLong, "s_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Su.idx("s_suppkey")),
          lng(r, Su.idx("s_nationkey")))))
      val j1 = b.join(n1, su, r => lng(r, 0), r => lng(r, 1),
        S("s_suppkey" -> CLong, "n1" -> CString)) { (n, s) =>
        Array[Any](lng(s, 0), str(n, 1))
      }
      val li = b.input("lineitem",
        S("l_suppkey" -> CLong, "l_orderkey" -> CLong, "l_year" -> CLong, "rev" -> CLong))(
        filterProject(
          r => { val d = str(r, L.idx("l_shipdate")); d >= "1995-01-01" && d <= "1996-12-31" },
          r => Array[Any](lng(r, L.idx("l_suppkey")), lng(r, L.idx("l_orderkey")),
            year(str(r, L.idx("l_shipdate"))),
            rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val j2 = b.join(j1, li, r => lng(r, 0), r => lng(r, 0),
        S("l_orderkey" -> CLong, "n1" -> CString, "l_year" -> CLong, "rev" -> CLong)) { (a, l) =>
        Array[Any](lng(l, 1), str(a, 1), lng(l, 2), lng(l, 3))
      }
      val od = b.input("orders", S("o_orderkey" -> CLong, "o_custkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, O.idx("o_orderkey")),
          lng(r, O.idx("o_custkey")))))
      val j3 = b.join(j2, od, r => lng(r, 0), r => lng(r, 0),
        S("o_custkey" -> CLong, "n1" -> CString, "l_year" -> CLong, "rev" -> CLong)) { (a, o) =>
        Array[Any](lng(o, 1), str(a, 1), lng(a, 2), lng(a, 3))
      }
      val n2 = b.input("nation", S("n_nationkey" -> CLong, "n_name" -> CString))(filterProject(
        r => { val n = str(r, N.idx("n_name")); n == NA || n == NB },
        r => Array[Any](lng(r, N.idx("n_nationkey")), str(r, N.idx("n_name")))))
      val cu = b.input("customer", S("c_custkey" -> CLong, "c_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Cu.idx("c_custkey")),
          lng(r, Cu.idx("c_nationkey")))))
      val j4 = b.join(n2, cu, r => lng(r, 0), r => lng(r, 1),
        S("c_custkey" -> CLong, "n2" -> CString)) { (n, c) =>
        Array[Any](lng(c, 0), str(n, 1))
      }
      val j5 = b.join(j3, j4, r => lng(r, 0), r => lng(r, 0),
        S("n1" -> CString, "n2" -> CString, "l_year" -> CLong, "rev" -> CLong)) { (a, c) =>
        val na = str(a, 1); val nb = str(c, 1)
        if ((na == NA && nb == NB) || (na == NB && nb == NA))
          Array[Any](na, nb, lng(a, 2), lng(a, 3))
        else null
      }
      sumAgg(b, j5, Vector(0, 1, 2), Vector(3),
        S("supp_nation" -> CString, "cust_nation" -> CString, "l_year" -> CLong,
          "revenue" -> CDouble)) { (k, a) =>
        Array[Any](k(0), k(1), k(2), a(0).toDouble / 1e4)
      }
      b.build()
    })

  // ------------------------------------------------------------------- Q8

  val q8: Q = Q("q8", "III",
    Vector("part", "supplier", "lineitem", "orders", "customer", "nation", "region"),
    body = """SELECT o_year,
      | CAST(SUM(CASE WHEN nation = 'NATION_06' THEN volume ELSE 0 END) AS DOUBLE)
      |   / CAST(SUM(volume) AS DOUBLE) AS mkt_share
      |FROM (SELECT CAST(SUBSTR(o_orderdate, 1, 4) AS BIGINT) AS o_year,
      |       l_extendedprice * (1 - l_discount) AS volume, n2.n_name AS nation
      |      FROM part, supplier, lineitem, orders, customer, nation n1, nation n2, region
      |      WHERE p_partkey = l_partkey AND s_suppkey = l_suppkey AND l_orderkey = o_orderkey
      |       AND o_custkey = c_custkey AND c_nationkey = n1.n_nationkey
      |       AND n1.n_regionkey = r_regionkey AND r_name = 'REGION_1'
      |       AND s_nationkey = n2.n_nationkey
      |       AND o_orderdate BETWEEN '1995-01-01' AND '1996-12-31'
      |       AND p_type = 'ECONOMY') all_nations
      |GROUP BY o_year""".stripMargin,
    mkPlan = { t =>
      val P = t.sch("part"); val Su = t.sch("supplier"); val L = t.sch("lineitem")
      val O = t.sch("orders"); val Cu = t.sch("customer"); val N = t.sch("nation")
      val Re = t.sch("region")
      val b = new PlanBuilder("q8")
      val pa = b.input("part", S("p_partkey" -> CLong))(filterProject(
        r => str(r, P.idx("p_type")) == "ECONOMY",
        r => Array[Any](lng(r, P.idx("p_partkey")))))
      val li = b.input("lineitem",
        S("l_partkey" -> CLong, "l_suppkey" -> CLong, "l_orderkey" -> CLong, "rev" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, L.idx("l_partkey")),
          lng(r, L.idx("l_suppkey")), lng(r, L.idx("l_orderkey")),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val j1 = b.join(pa, li, r => lng(r, 0), r => lng(r, 0),
        S("l_suppkey" -> CLong, "l_orderkey" -> CLong, "rev" -> CLong)) { (_, l) =>
        Array[Any](lng(l, 1), lng(l, 2), lng(l, 3))
      }
      val su = b.input("supplier", S("s_suppkey" -> CLong, "s_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Su.idx("s_suppkey")),
          lng(r, Su.idx("s_nationkey")))))
      val j2 = b.join(j1, su, r => lng(r, 0), r => lng(r, 0),
        S("l_orderkey" -> CLong, "rev" -> CLong, "s_nationkey" -> CLong)) { (a, s) =>
        Array[Any](lng(a, 1), lng(a, 2), lng(s, 1))
      }
      val od = b.input("orders", S("o_orderkey" -> CLong, "o_custkey" -> CLong, "o_year" -> CLong))(
        filterProject(
          r => { val d = str(r, O.idx("o_orderdate")); d >= "1995-01-01" && d <= "1996-12-31" },
          r => Array[Any](lng(r, O.idx("o_orderkey")), lng(r, O.idx("o_custkey")),
            year(str(r, O.idx("o_orderdate"))))))
      val j3 = b.join(j2, od, r => lng(r, 0), r => lng(r, 0),
        S("o_custkey" -> CLong, "rev" -> CLong, "s_nationkey" -> CLong, "o_year" -> CLong)) {
        (a, o) => Array[Any](lng(o, 1), lng(a, 1), lng(a, 2), lng(o, 2))
      }
      val cu = b.input("customer", S("c_custkey" -> CLong, "c_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Cu.idx("c_custkey")),
          lng(r, Cu.idx("c_nationkey")))))
      val j4 = b.join(j3, cu, r => lng(r, 0), r => lng(r, 0),
        S("rev" -> CLong, "s_nationkey" -> CLong, "o_year" -> CLong, "c_nationkey" -> CLong)) {
        (a, c) => Array[Any](lng(a, 1), lng(a, 2), lng(a, 3), lng(c, 1))
      }
      val re = b.input("region", S("r_regionkey" -> CLong))(filterProject(
        r => str(r, Re.idx("r_name")) == "REGION_1",
        r => Array[Any](lng(r, Re.idx("r_regionkey")))))
      val n1 = b.input("nation", S("n_nationkey" -> CLong, "n_regionkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, N.idx("n_nationkey")),
          lng(r, N.idx("n_regionkey")))))
      val j5 = b.join(re, n1, r => lng(r, 0), r => lng(r, 1),
        S("n_nationkey" -> CLong)) { (_, n) => Array[Any](lng(n, 0)) }
      val j6 = b.join(j4, j5, r => lng(r, 3), r => lng(r, 0),
        S("rev" -> CLong, "s_nationkey" -> CLong, "o_year" -> CLong)) { (a, _) =>
        Array[Any](lng(a, 0), lng(a, 1), lng(a, 2))
      }
      val n2 = b.input("nation", S("n_nationkey" -> CLong, "n_name" -> CString))(
        filterProject(_ => true, r => Array[Any](lng(r, N.idx("n_nationkey")),
          str(r, N.idx("n_name")))))
      val j7 = b.join(j6, n2, r => lng(r, 1), r => lng(r, 0),
        S("o_year" -> CLong, "rev" -> CLong, "nation" -> CString)) { (a, n) =>
        Array[Any](lng(a, 2), lng(a, 0), str(n, 1))
      }
      val out = S("o_year" -> CLong, "mkt_share" -> CDouble)
      b.agg(j7, key = r => Vector(r(0)), keyOut = r => Vector(r(0)), nAccs = 2, out) {
        (accs, r) =>
          val v = lng(r, 1)
          if (str(r, 2) == "NATION_06") accs(0) += v
          accs(1) += v
      } { (k, a) =>
        Array[Any](k(0), (a(0).toDouble / 1e4) / (a(1).toDouble / 1e4))
      }
      b.build()
    })

  // ------------------------------------------------------------------- Q9

  val q9: Q = Q("q9", "III",
    Vector("part", "supplier", "lineitem", "partsupp", "orders", "nation"),
    body = """SELECT nation, o_year, CAST(SUM(amount) AS DOUBLE) AS sum_profit
      |FROM (SELECT n_name AS nation, CAST(SUBSTR(o_orderdate, 1, 4) AS BIGINT) AS o_year,
      |       l_extendedprice * (1 - l_discount) - ps_supplycost * l_quantity AS amount
      |      FROM part, supplier, lineitem, partsupp, orders, nation
      |      WHERE s_suppkey = l_suppkey AND ps_suppkey = l_suppkey AND ps_partkey = l_partkey
      |       AND p_partkey = l_partkey AND o_orderkey = l_orderkey AND s_nationkey = n_nationkey
      |       AND p_type = 'PROMO') profit
      |GROUP BY nation, o_year""".stripMargin,
    mkPlan = { t =>
      val P = t.sch("part"); val Su = t.sch("supplier"); val L = t.sch("lineitem")
      val Ps = t.sch("partsupp"); val O = t.sch("orders"); val N = t.sch("nation")
      val b = new PlanBuilder("q9")
      val pa = b.input("part", S("p_partkey" -> CLong))(filterProject(
        r => str(r, P.idx("p_type")) == "PROMO",
        r => Array[Any](lng(r, P.idx("p_partkey")))))
      val li = b.input("lineitem",
        S("l_partkey" -> CLong, "l_suppkey" -> CLong, "l_orderkey" -> CLong,
          "qty" -> CLong, "rev" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, L.idx("l_partkey")),
          lng(r, L.idx("l_suppkey")), lng(r, L.idx("l_orderkey")),
          math.round(dbl(r, L.idx("l_quantity"))),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val j1 = b.join(pa, li, r => lng(r, 0), r => lng(r, 0),
        S("l_partkey" -> CLong, "l_suppkey" -> CLong, "l_orderkey" -> CLong,
          "qty" -> CLong, "rev" -> CLong)) { (_, l) => l }
      val su = b.input("supplier", S("s_suppkey" -> CLong, "s_nationkey" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Su.idx("s_suppkey")),
          lng(r, Su.idx("s_nationkey")))))
      val j2 = b.join(j1, su, r => lng(r, 1), r => lng(r, 0),
        S("l_partkey" -> CLong, "l_suppkey" -> CLong, "l_orderkey" -> CLong,
          "qty" -> CLong, "rev" -> CLong, "s_nationkey" -> CLong)) { (a, s) =>
        Array[Any](lng(a, 0), lng(a, 1), lng(a, 2), lng(a, 3), lng(a, 4), lng(s, 1))
      }
      val ps = b.input("partsupp",
        S("ps_partkey" -> CLong, "ps_suppkey" -> CLong, "cost" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, Ps.idx("ps_partkey")),
          lng(r, Ps.idx("ps_suppkey")), c2(dbl(r, Ps.idx("ps_supplycost"))))))
      val j3 = b.join(j2, ps,
        r => (lng(r, 0), lng(r, 1)), r => (lng(r, 0), lng(r, 1)),
        S("l_orderkey" -> CLong, "s_nationkey" -> CLong, "amount" -> CLong)) { (a, p) =>
        val amount = lng(a, 4) - lng(p, 2) * lng(a, 3) * 100L
        Array[Any](lng(a, 2), lng(a, 5), amount)
      }
      val od = b.input("orders", S("o_orderkey" -> CLong, "o_year" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, O.idx("o_orderkey")),
          year(str(r, O.idx("o_orderdate"))))))
      val j4 = b.join(j3, od, r => lng(r, 0), r => lng(r, 0),
        S("s_nationkey" -> CLong, "o_year" -> CLong, "amount" -> CLong)) { (a, o) =>
        Array[Any](lng(a, 1), lng(o, 1), lng(a, 2))
      }
      val na = b.input("nation", S("n_nationkey" -> CLong, "n_name" -> CString))(
        filterProject(_ => true, r => Array[Any](lng(r, N.idx("n_nationkey")),
          str(r, N.idx("n_name")))))
      val j5 = b.join(j4, na, r => lng(r, 0), r => lng(r, 0),
        S("nation" -> CString, "o_year" -> CLong, "amount" -> CLong)) { (a, n) =>
        Array[Any](str(n, 1), lng(a, 1), lng(a, 2))
      }
      sumAgg(b, j5, Vector(0, 1), Vector(2),
        S("nation" -> CString, "o_year" -> CLong, "sum_profit" -> CDouble)) { (k, a) =>
        Array[Any](k(0), k(1), a(0).toDouble / 1e4)
      }
      b.build()
    })

  // ------------------------------------------------------------------ Q12

  val q12: Q = Q("q12", "-", Vector("orders", "lineitem"),
    body = """SELECT l_shipmode,
      | CAST(SUM(CASE WHEN o_orderpriority IN ('1-URGENT', '2-HIGH') THEN 1 ELSE 0 END) AS BIGINT)
      |   AS high_line_count,
      | CAST(SUM(CASE WHEN o_orderpriority IN ('1-URGENT', '2-HIGH') THEN 0 ELSE 1 END) AS BIGINT)
      |   AS low_line_count
      |FROM orders, lineitem
      |WHERE o_orderkey = l_orderkey AND l_shipmode IN ('MAIL', 'SHIP')
      | AND l_commitdate < l_receiptdate AND l_shipdate < l_commitdate
      | AND l_receiptdate >= '1994-01-01' AND l_receiptdate < '1995-01-01'
      |GROUP BY l_shipmode""".stripMargin,
    mkPlan = { t =>
      val O = t.sch("orders"); val L = t.sch("lineitem")
      val b = new PlanBuilder("q12")
      val li = b.input("lineitem", S("l_orderkey" -> CLong, "l_shipmode" -> CString))(
        filterProject(
          r => {
            val m = str(r, L.idx("l_shipmode"))
            val (sd, cd, rd) = (str(r, L.idx("l_shipdate")), str(r, L.idx("l_commitdate")),
              str(r, L.idx("l_receiptdate")))
            (m == "MAIL" || m == "SHIP") && cd < rd && sd < cd &&
              rd >= "1994-01-01" && rd < "1995-01-01"
          },
          r => Array[Any](lng(r, L.idx("l_orderkey")), str(r, L.idx("l_shipmode")))))
      val od = b.input("orders", S("o_orderkey" -> CLong, "hi" -> CLong))(
        filterProject(_ => true, r => {
          val p = str(r, O.idx("o_orderpriority"))
          Array[Any](lng(r, O.idx("o_orderkey")),
            if (p == "1-URGENT" || p == "2-HIGH") 1L else 0L)
        }))
      val j1 = b.join(li, od, r => lng(r, 0), r => lng(r, 0),
        S("l_shipmode" -> CString, "hi" -> CLong)) { (l, o) =>
        Array[Any](str(l, 1), lng(o, 1))
      }
      val out = S("l_shipmode" -> CString, "high_line_count" -> CLong, "low_line_count" -> CLong)
      b.agg(j1, key = r => Vector(r(0)), keyOut = r => Vector(r(0)), nAccs = 2, out) {
        (accs, r) => val h = lng(r, 1); accs(0) += h; accs(1) += 1L - h
      } { (k, a) => Array[Any](k(0), a(0), a(1)) }
      b.build()
    })

  // ------------------------------------------------------------------ Q14

  val q14: Q = Q("q14", "-", Vector("lineitem", "part"),
    body = """SELECT 100.00 * CAST(SUM(CASE WHEN p_type = 'PROMO'
      |   THEN l_extendedprice * (1 - l_discount) ELSE 0 END) AS DOUBLE)
      | / CAST(SUM(l_extendedprice * (1 - l_discount)) AS DOUBLE) AS promo_revenue
      |FROM lineitem, part
      |WHERE l_partkey = p_partkey AND l_shipdate >= '1995-09-01' AND l_shipdate < '1995-10-01'
      |HAVING COUNT(*) > 0""".stripMargin,
    mkPlan = { t =>
      val L = t.sch("lineitem"); val P = t.sch("part")
      val b = new PlanBuilder("q14")
      val li = b.input("lineitem", S("l_partkey" -> CLong, "rev" -> CLong))(filterProject(
        r => { val d = str(r, L.idx("l_shipdate")); d >= "1995-09-01" && d < "1995-10-01" },
        r => Array[Any](lng(r, L.idx("l_partkey")),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val pa = b.input("part", S("p_partkey" -> CLong, "promo" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, P.idx("p_partkey")),
          if (str(r, P.idx("p_type")) == "PROMO") 1L else 0L)))
      val j1 = b.join(pa, li, r => lng(r, 0), r => lng(r, 0),
        S("promoRev" -> CLong, "rev" -> CLong)) { (p, l) =>
        val rev = lng(l, 1)
        Array[Any](if (lng(p, 1) == 1L) rev else 0L, rev)
      }
      sumAgg(b, j1, Vector(), Vector(0, 1), S("promo_revenue" -> CDouble)) { (_, a) =>
        Array[Any](100.0 * (a(0).toDouble / 1e4) / (a(1).toDouble / 1e4))
      }
      b.build()
    })

  // ------------------------------------------------------------------ Q19

  val q19: Q = Q("q19", "-", Vector("lineitem", "part"),
    body = """SELECT CAST(SUM(l_extendedprice * (1 - l_discount)) AS DOUBLE) AS revenue
      |FROM lineitem, part
      |WHERE p_partkey = l_partkey AND
      | ((p_type = 'SMALL' AND l_quantity BETWEEN 1 AND 11 AND p_size BETWEEN 1 AND 5)
      |  OR (p_type = 'MEDIUM' AND l_quantity BETWEEN 10 AND 20 AND p_size BETWEEN 1 AND 10)
      |  OR (p_type = 'LARGE' AND l_quantity BETWEEN 20 AND 30 AND p_size BETWEEN 1 AND 15))
      |HAVING COUNT(*) > 0""".stripMargin,
    mkPlan = { t =>
      val L = t.sch("lineitem"); val P = t.sch("part")
      val b = new PlanBuilder("q19")
      val li = b.input("lineitem", S("l_partkey" -> CLong, "qty" -> CLong, "rev" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, L.idx("l_partkey")),
          math.round(dbl(r, L.idx("l_quantity"))),
          rev4(dbl(r, L.idx("l_extendedprice")), dbl(r, L.idx("l_discount"))))))
      val pa = b.input("part", S("p_partkey" -> CLong, "p_type" -> CString, "p_size" -> CLong))(
        filterProject(_ => true, r => Array[Any](lng(r, P.idx("p_partkey")),
          str(r, P.idx("p_type")), lng(r, P.idx("p_size")))))
      val j1 = b.join(pa, li, r => lng(r, 0), r => lng(r, 0),
        S("rev" -> CLong)) { (p, l) =>
        val ty = str(p, 1); val sz = lng(p, 2); val q = lng(l, 1)
        val ok = (ty == "SMALL" && q >= 1 && q <= 11 && sz >= 1 && sz <= 5) ||
          (ty == "MEDIUM" && q >= 10 && q <= 20 && sz >= 1 && sz <= 10) ||
          (ty == "LARGE" && q >= 20 && q <= 30 && sz >= 1 && sz <= 15)
        if (ok) Array[Any](lng(l, 2)) else null
      }
      sumAgg(b, j1, Vector(), Vector(0), S("revenue" -> CDouble)) { (_, a) =>
        Array[Any](a(0).toDouble / 1e4)
      }
      b.build()
    })

  // --------------------------------------------------------------- registry

  val all: Vector[Q] = Vector(q1, q3, q5, q6, q7, q8, q9, q10, q12, q14, q19)

  /** The paper's 8 representative queries: I = {1, 6}, II = {3, 10},
    * III = {5, 7, 8, 9}.
    */
  val representative: Vector[Q] = Vector(q1, q6, q3, q10, q5, q7, q8, q9)

  val byId: Map[String, Q] = all.map(q => q.id -> q).toMap
}
