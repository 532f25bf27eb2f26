package repro.core

/** The SQL surface of paper Section 7.2: RMA ops in the FROM clause. */
class RmaSqlSpec extends RmaFixtures {

  override def beforeAll(): Unit = {
    super.beforeAll()
    weather.createOrReplaceTempView("r")
    weatherLate.createOrReplaceTempView("rlate")
    makeDf(
      Seq("m" -> org.apache.spark.sql.types.StringType,
        "x" -> org.apache.spark.sql.types.DoubleType),
      Seq(Seq("s1", 2.0), Seq("s2", 3.0))).createOrReplaceTempView("s")
  }

  test("SELECT * FROM INV(r BY U) — the paper's first example query") {
    val v = RmaSql.sql(spark, "SELECT * FROM INV(rlate BY T);")
    assert(v.columns.toSeq == Seq("T", "H", "W"))
    assertDfClose(v, Seq(
      Seq("7am", -5.0 / 26, 7.0 / 26),
      Seq("8am", 8.0 / 26, -6.0 / 26)))
  }

  test("SELECT * FROM MMU(r BY U, s BY V) — the paper's binary example") {
    val v = RmaSql.sql(spark, "SELECT * FROM MMU(r BY T, s BY m)")
    assert(v.columns.toSeq == Seq("T", "x"))
    // [1,3;1,4;6,7;8,5] * [2;3]
    assertDfClose(v, Seq(
      Seq("5am", 11.0), Seq("6am", 14.0), Seq("7am", 33.0), Seq("8am", 31.0)))
  }

  test("projection and WHERE around an RMA call") {
    val v = RmaSql.sql(spark, "SELECT T, H FROM QQR(r BY T) WHERE T > '6am'")
    assert(v.columns.toSeq == Seq("T", "H"))
    assert(v.count() == 2)
  }

  test("nested RMA calls: INV of CPD (the OLS building block)") {
    val v = RmaSql.sql(spark, "SELECT * FROM INV(CPD(r BY T, r BY T) BY C)")
    assert(v.columns.toSeq == Seq("C", "H", "W"))
    // equals inv of the Gram matrix
    val gram = repro.matrix.Kernels.cpd(collectMatrix(weather, Seq("T")),
      collectMatrix(weather, Seq("T")))
    val expect = repro.matrix.Kernels.inv(gram)
    val got = collectMatrix(v, Seq("C"))
    assert(got.approxEquals(expect, 1e-9))
  }

  test("case-insensitive op names and keywords") {
    val v = RmaSql.sql(spark, "select * from inv(rlate by T)")
    assert(v.count() == 2)
  }

  test("multi-attribute order schema in BY") {
    val v = RmaSql.sql(spark, "SELECT * FROM QQR(r BY W, T)")
    assert(v.columns.toSeq == Seq("W", "T", "H"))
  }

  test("plain SQL without RMA ops passes through") {
    val v = RmaSql.sql(spark, "SELECT count(*) AS n FROM r")
    assert(v.collect().head.getLong(0) == 4L)
  }

  test("aggregation on top of an RMA result") {
    val v = RmaSql.sql(spark, "SELECT count(*) AS n FROM TRA(r BY T)")
    assert(v.collect().head.getLong(0) == 2L)
  }

  test("expr evaluates a bare RMA expression") {
    val v = RmaSql.expr(spark, "DET(rlate BY T)")
    assert(v.columns.toSeq == Seq("C", "det"))
    assert(math.abs(v.collect().head.getDouble(1) + 26.0) < 1e-9)
  }

  test("unary op with two arguments is rejected") {
    val e = intercept[IllegalArgumentException] {
      RmaSql.sql(spark, "SELECT * FROM INV(r BY T, s BY m)")
    }
    assert(e.getMessage.contains("one argument"))
  }

  test("binary op with one argument is rejected") {
    val e = intercept[IllegalArgumentException] {
      RmaSql.sql(spark, "SELECT * FROM MMU(r BY T)")
    }
    assert(e.getMessage.contains("two arguments"))
  }

  test("missing BY keyword is rejected") {
    val e = intercept[IllegalArgumentException] {
      RmaSql.sql(spark, "SELECT * FROM INV(r T)")
    }
    assert(e.getMessage.contains("BY"))
  }

  test("trailing garbage after expr is rejected") {
    val e = intercept[IllegalArgumentException] {
      RmaSql.expr(spark, "DET(rlate BY T) nonsense")
    }
    assert(e.getMessage.contains("trailing"))
  }
}
