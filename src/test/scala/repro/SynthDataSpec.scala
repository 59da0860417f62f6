package repro

import org.apache.spark.sql.functions._

class SynthDataSpec extends SparkSpec {
  private val SF = 0.004

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, SF).agg(sum("l_orderkey"), sum("l_extendedprice")).collect()(0)
    val b = SynthData.lineitem(spark, SF).agg(sum("l_orderkey"), sum("l_extendedprice")).collect()(0)
    assert(a == b)
  }

  test("row counts scale with the scale factor") {
    assert(SynthData.lineitem(spark, 0.002).count() == 12000)
    assert(SynthData.orders(spark, 0.002).count() == 3000)
    assert(SynthData.customer(spark, 0.002).count() == 300)
    assert(SynthData.supplier(spark, 0.002).count() == 20)
  }

  test("nation and region are fixed dimensions") {
    assert(SynthData.nation(spark).count() == 25)
    assert(SynthData.region(spark).count() == 5)
    val n = SynthData.nation(spark).collect()
    assert(n.forall(r => r.getInt(2) == r.getInt(0) % 5))
    assert(n.map(_.getString(1)).toSet.size == 25)
  }

  test("l_quantity is integer-valued (exact under every summation)") {
    val bad = SynthData.lineitem(spark, SF)
      .filter(col("l_quantity") =!= col("l_quantity").cast("long").cast("double")).count()
    assert(bad == 0)
  }

  test("money columns carry exactly two decimals") {
    val li = SynthData.lineitem(spark, SF)
    for (c <- Seq("l_extendedprice", "l_discount", "l_tax")) {
      val bad = li.filter(round(col(c), 2) =!= col(c)).count()
      assert(bad == 0, s"$c not 2-decimal")
    }
  }

  test("lineitem foreign keys stay in range") {
    val li = SynthData.lineitem(spark, SF)
    val mx = li.agg(max("l_orderkey"), max("l_partkey"), max("l_suppkey"),
      min("l_orderkey"), min("l_partkey"), min("l_suppkey")).collect()(0)
    assert(mx.getLong(0) <= SynthData.orders(spark, SF).count())
    assert(mx.getLong(1) <= SynthData.part(spark, SF).count())
    assert(mx.getLong(2) <= SynthData.nSupplier(SF))
    assert(mx.getLong(3) >= 1 && mx.getLong(4) >= 1 && mx.getLong(5) >= 1)
  }

  test("partsupp composite key is unique") {
    val ps = SynthData.partsupp(spark, SF)
    assert(ps.count() == ps.select("ps_partkey", "ps_suppkey").distinct().count())
  }

  test("lineitem date columns are ordered sensibly") {
    val li = SynthData.lineitem(spark, SF)
    assert(li.filter(col("l_receiptdate") <= col("l_shipdate")).count() == 0)
  }

  test("shipmode and priority domains match the query literals") {
    val modes = SynthData.lineitem(spark, SF).select("l_shipmode").distinct()
      .collect().map(_.getString(0)).toSet
    assert(modes == Set("AIR", "MAIL", "SHIP", "TRUCK"))
    val prios = SynthData.orders(spark, SF).select("o_orderpriority").distinct()
      .collect().map(_.getString(0)).toSet
    assert(prios.contains("1-URGENT") && prios.contains("2-HIGH"))
  }

  test("part types include the PROMO and ECONOMY literals used by q8/q9/q14") {
    val types = SynthData.part(spark, SF).select("p_type").distinct()
      .collect().map(_.getString(0)).toSet
    assert(Set("PROMO", "ECONOMY", "SMALL", "MEDIUM", "LARGE").subsetOf(types))
  }
}
