package repro

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.{Rma, RmaFixtures, RmaSql}
import repro.matrix.Kernels

/** End-to-end reproductions of the paper's worked examples:
  *  - Figure 3 (inversion pipeline) and Figure 4 (qqr / tra),
  *  - Figure 10 / Example 6.9 (double transpose),
  *  - Section 5 / Figures 5-7 (mixed covariance workload w1..w8).
  */
class PaperExamplesSpec extends RmaFixtures {
  import repro.matrix.MatrixTestUtil._

  test("Figure 3: v = inv_T(sigma_{T>6am}(r)) end to end") {
    val v = Rma.inv(weather.filter("T > '6am'"), Seq("T"))
    assert(v.columns.toSeq == Seq("T", "H", "W"))
    // paper shows (7am, -0.19, 0.27), (8am, 0.31, -0.23)
    assertDfClose(v, Seq(
      Seq("7am", -0.1923076923076923, 0.2692307692307692),
      Seq("8am", 0.3076923076923077, -0.2307692307692307)), 1e-12)
  }

  test("Figure 4a: qqr_T(r) preserves T and the application schema") {
    val q = Rma.qqr(weather, Seq("T"))
    assert(q.columns.toSeq == Seq("T", "H", "W"))
    // Q reproduces the sorted application part when multiplied with R
    val qm = collectMatrix(q, Seq("T"))
    val rm = collectMatrix(Rma.rqr(weather, Seq("T")), Seq("C"))
    assertClose(Kernels.mmu(qm, rm), collectMatrix(weather, Seq("T")), 1e-9)
    // column 1 of Q is the normalised first app column (canonical signs)
    val h = Array(1.0, 1.0, 6.0, 8.0)
    val n = math.sqrt(h.map(x => x * x).sum)
    val q1 = qm.col(0)
    h.indices.foreach(i => assert(math.abs(q1(i) - h(i) / n) < 1e-9))
  }

  test("Figure 4b: tra_T(r) — transposed relation with full context") {
    val t = Rma.tra(weather, Seq("T"))
    assertDfClose(t, Seq(
      Seq("H", 1.0, 1.0, 6.0, 8.0),
      Seq("W", 3.0, 4.0, 7.0, 5.0)))
    // "relation r records that Humidity (H) was 1 at 6am, which is also
    // recorded in the transposed relation"
    val h6 = t.filter("C = 'H'").select("6am").collect().head.getDouble(0)
    assert(h6 == 1.0)
  }

  test("Example 6.9 / Figure 10: tra_C(tra_T(r)) loses no information") {
    val r1 = Rma.tra(weather, Seq("T"))
    assert(r1.columns.toSeq == Seq("C", "5am", "6am", "7am", "8am"))
    val r2 = Rma.tra(r1, Seq("C"))
    assert(r2.columns.toSeq == Seq("C", "H", "W"))
    assertDfClose(r2, Seq(
      Seq("5am", 1.0, 3.0), Seq("6am", 1.0, 4.0), Seq("7am", 6.0, 7.0), Seq("8am", 8.0, 5.0)))
  }

  /** The paper's §5 mixed workload, expressions w1..w8 of Figure 6.
    * The printed cell values in Figure 7 do not match the Figure 5 input in
    * the extracted text (OCR garbling); we assert against an independently
    * computed covariance of the actual input instead, plus DuckDB for w1/w2.
    */
  test("Section 5: covariance workload w1..w8") {
    // w1: CA users' ratings
    val w1 = users.join(ratings, "User").filter("State = 'CA'")
      .select("User", "Balto", "Heat", "Net")
    assert(w1.count() == 2)
    Oracle.assertEquivalent(
      w1,
      """SELECT u.User AS User, CAST(r.Balto AS DOUBLE) AS Balto,
        |CAST(r.Heat AS DOUBLE) AS Heat, CAST(r.Net AS DOUBLE) AS Net
        |FROM u JOIN r ON u.User = r.User WHERE u.State = 'CA'""".stripMargin,
      "u" -> users, "r" -> ratings)

    // w2: averages
    val w2 = w1.agg(avg("Balto").as("Balto"), avg("Heat").as("Heat"), avg("Net").as("Net"))

    // w3: centered ratings = sub_{U;V}(w1, rho_V(pi_U(w1)) x w2)
    val means = w1.select(col("User").as("V")).crossJoin(w2)
    val w3 = Rma.sub(w1, Seq("User"), means, Seq("V"))
      .select("User", "Balto", "Heat", "Net")
    // independent check of centering
    val balto = w3.orderBy("User").collect().map(_.getDouble(1)).toSeq
    assert(math.abs(balto.sum) < 1e-12, "centered column must sum to zero")

    // w4: transpose
    val w4 = Rma.tra(w3, Seq("User"))
    assert(w4.columns.toSeq == Seq("C", "Ann", "Jan"))

    // w5: mmu_{C;U}(w4, w3)
    val w5 = Rma.mmu(w4, Seq("C"), w3, Seq("User"))
    assert(w5.columns.toSeq == Seq("C", "Balto", "Heat", "Net"))

    // w6, w7: divide by count-1
    val m = w1.count()
    val w7 = w5.select(col("C"),
      (col("Balto") / (m - 1)).as("Balto"),
      (col("Heat") / (m - 1)).as("Heat"),
      (col("Net") / (m - 1)).as("Net"))

    // Independent covariance of the CA ratings:
    //   Ann (2.0, 1.5, 0.5), Jan (1.0, 4.0, 1.0)
    //   means (1.5, 2.75, 0.75); centered Ann (0.5, -1.25, -0.25)
    val expected = Map(
      ("Balto", "Balto") -> 0.5, ("Balto", "Heat") -> -1.25, ("Balto", "Net") -> -0.25,
      ("Heat", "Heat") -> 3.125, ("Heat", "Net") -> 0.625, ("Net", "Net") -> 0.125)
    val got = w7.collect().map(r => r.getString(0) -> r).toMap
    for (((a, b), v) <- expected) {
      val row = got(a)
      val idx = w7.columns.indexOf(b)
      assert(math.abs(row.getDouble(idx) - v) < 1e-9, s"cov($a,$b)")
      // symmetry
      val rowB = got(b)
      assert(math.abs(rowB.getDouble(w7.columns.indexOf(a)) - v) < 1e-9, s"cov($b,$a)")
    }

    // DuckDB cross-check of the full covariance matrix via covar_samp
    val melted = w7.selectExpr("C", "stack(3, 'Balto', Balto, 'Heat', Heat, 'Net', Net) as (C2, v)")
    Oracle.assertEquivalent(
      melted,
      """WITH x AS (SELECT u.User u, CAST(r.Balto AS DOUBLE) Balto,
        |  CAST(r.Heat AS DOUBLE) Heat, CAST(r.Net AS DOUBLE) Net
        |  FROM u JOIN r ON u.User = r.User WHERE u.State='CA'),
        |cols(C) AS (VALUES ('Balto'), ('Heat'), ('Net'))
        |SELECT a.C AS C, b.C AS C2,
        |  covar_samp(CASE a.C WHEN 'Balto' THEN x.Balto WHEN 'Heat' THEN x.Heat ELSE x.Net END,
        |             CASE b.C WHEN 'Balto' THEN x.Balto WHEN 'Heat' THEN x.Heat ELSE x.Net END) AS v
        |FROM cols a CROSS JOIN cols b CROSS JOIN x
        |GROUP BY a.C, b.C""".stripMargin,
      "u" -> users, "r" -> ratings)

    // w8: join with films, select Lee's films
    val w8 = w7.join(films, w7("C") === films("Title"))
      .filter("Director = 'Lee'")
      .select(col("Title").as("T"), col("Balto"), col("Heat"), col("Net"))
    val titles = w8.select("T").collect().map(_.getString(0)).toSet
    assert(titles == Set("Heat", "Balto"))
  }

  test("Section 5 workload via the SQL surface") {
    users.createOrReplaceTempView("u_sql")
    ratings.createOrReplaceTempView("r_sql")
    val w1 = spark.sql(
      """SELECT u_sql.User, Balto, Heat, Net FROM u_sql JOIN r_sql
        |ON u_sql.User = r_sql.User WHERE State = 'CA'""".stripMargin)
    w1.createOrReplaceTempView("w1_sql")
    val w3 = spark.sql(
      """SELECT w1_sql.User AS User,
        |  Balto - (SELECT AVG(Balto) FROM w1_sql) AS Balto,
        |  Heat  - (SELECT AVG(Heat)  FROM w1_sql) AS Heat,
        |  Net   - (SELECT AVG(Net)   FROM w1_sql) AS Net
        |FROM w1_sql""".stripMargin)
    w3.createOrReplaceTempView("w3_sql")
    // Folded expression of the paper §7.2: mmu(tra(w3), w3) scaled by 1/(m-1)
    val cov = RmaSql.sql(spark,
      """SELECT C, Balto/(m-1) AS Balto, Heat/(m-1) AS Heat, Net/(m-1) AS Net
        |FROM MMU(TRA(w3_sql BY User) BY C, w3_sql BY User)
        |CROSS JOIN (SELECT COUNT(*) AS m FROM w1_sql)""".stripMargin)
    val got = cov.collect().map(r => (r.getString(0), r.getDouble(1), r.getDouble(2), r.getDouble(3)))
      .sortBy(_._1)
    assert(got.map(_._1).toSeq == Seq("Balto", "Heat", "Net"))
    assert(math.abs(got(0)._2 - 0.5) < 1e-9)   // var(Balto)
    assert(math.abs(got(1)._3 - 3.125) < 1e-9) // var(Heat)
    assert(math.abs(got(2)._4 - 0.125) < 1e-9) // var(Net)
  }

  test("OLS regression (paper workload 1 formulation) via RMA ops") {
    // MMU(INV(CPD(A, A)), CPD(A, V)) over a synthetic linear relationship.
    val n = 200
    val a = makeDf(
      Seq("k" -> org.apache.spark.sql.types.StringType,
        "c0" -> org.apache.spark.sql.types.DoubleType,
        "x" -> org.apache.spark.sql.types.DoubleType),
      (1 to n).map(i => Seq(f"k$i%04d", 1.0, i.toDouble / 10)))
    val v = makeDf(
      Seq("m" -> org.apache.spark.sql.types.StringType,
        "y" -> org.apache.spark.sql.types.DoubleType),
      (1 to n).map(i => Seq(f"k$i%04d", 4.0 + 2.5 * i / 10)))
    val cpdAA = Rma.cpd(a, Seq("k"), a, Seq("k"))
    val cpdAV = Rma.cpd(a, Seq("k"), v, Seq("m"))
    val beta = Rma.mmu(Rma.inv(cpdAA, Seq("C")), Seq("C"), cpdAV, Seq("C"))
    val coef = beta.orderBy("C").collect().map(_.getDouble(1))
    assert(math.abs(coef(0) - 4.0) < 1e-6, "intercept")
    assert(math.abs(coef(1) - 2.5) < 1e-6, "slope")
  }
}
