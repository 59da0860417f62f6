package repro.queries

import org.scalatest.funsuite.AnyFunSuite

class SqlSpec extends AnyFunSuite {

  test("typed CTEs cast every registered column") {
    val duck = Sql.render(Seq("lineitem"), "SELECT 1 AS one FROM lineitem", Sql.Duck)
    assert(duck.contains("lineitem AS (SELECT"))
    assert(duck.contains("FROM lineitem_raw"))
    assert(duck.contains("CAST(l_extendedprice AS DECIMAL(12,2)) AS l_extendedprice"))
    assert(duck.contains("CAST(l_discount AS DECIMAL(4,2)) AS l_discount"))
    assert(duck.contains("CAST(l_orderkey AS BIGINT) AS l_orderkey"))
  }

  test("dialects differ only in the text type") {
    val duck = Sql.render(Seq("nation"), "SELECT 1 AS one FROM nation", Sql.Duck)
    val spark = Sql.render(Seq("nation"), "SELECT 1 AS one FROM nation", Sql.SparkD)
    assert(duck.contains("AS VARCHAR"))
    assert(spark.contains("AS STRING"))
    assert(duck.replace("VARCHAR", "STRING") == spark)
  }

  test("all eight tables have type registrations") {
    assert(Sql.tableTypes.keySet == TpchData.names.toSet)
  }

  test("every query declares the tables its body references") {
    for (q <- TpchLite.all; t <- TpchData.names) {
      val used = ("""\b""" + t + """\b""").r.findFirstIn(q.body).isDefined
      if (used) assert(q.tables.contains(t), s"${q.id} references $t but does not declare it")
    }
  }

  test("every query aliases all output columns (oracle requirement)") {
    // crude but effective: each SELECT list item of the outer query ends in AS <name>
    for (q <- TpchLite.all)
      assert(q.body.toUpperCase.contains(" AS "), s"${q.id} must alias outputs")
  }

  test("money columns use exact decimal arithmetic in both dialects") {
    for (q <- TpchLite.all; d <- Seq(Sql.Duck, Sql.SparkD)) {
      val sql = Sql.render(q.tables, q.body, d)
      if (sql.contains("l_extendedprice"))
        assert(sql.contains("DECIMAL(12,2)"), s"${q.id}/$d lost the decimal cast")
    }
  }

  test("the representative set matches the paper's categories") {
    assert(TpchLite.representative.map(_.id) ==
      Vector("q1", "q6", "q3", "q10", "q5", "q7", "q8", "q9"))
    assert(TpchLite.representative.count(_.cat == "I") == 2)
    assert(TpchLite.representative.count(_.cat == "II") == 2)
    assert(TpchLite.representative.count(_.cat == "III") == 4)
  }

  test("query ids are unique and the registry is consistent") {
    assert(TpchLite.all.map(_.id).distinct.size == TpchLite.all.size)
    assert(TpchLite.byId("q9").cat == "III")
  }
}
