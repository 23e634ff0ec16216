package repro

/** Self-tests of the DuckDB oracle: it must accept true equivalences and,
  * crucially, reject wrong results — a correctness checker that cannot
  * fail is worthless.
  */
class OracleSpec extends SparkSpec {

  private def df(rows: Seq[(Long, Long)]) = {
    import spark.implicits._
    rows.toDF("l", "r")
  }

  test("accepts a matching aggregate") {
    val edges = df(Seq((1L, 1L), (1L, 2L), (2L, 1L)))
    import org.apache.spark.sql.functions._
    Oracle.assertEquivalent(
      edges.agg(count(lit(1)).as("n")),
      "SELECT COUNT(*) AS n FROM edges",
      "edges" -> edges)
  }

  test("accepts a matching multi-row projection") {
    val edges = df(Seq((1L, 10L), (2L, 20L)))
    Oracle.assertEquivalent(
      edges.select("l"),
      "SELECT l FROM edges",
      "edges" -> edges)
  }

  test("rejects a wrong row count") {
    val edges = df(Seq((1L, 1L), (2L, 2L)))
    import org.apache.spark.sql.functions._
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        edges.agg((count(lit(1)) + 1).as("n")), // off by one
        "SELECT COUNT(*) AS n FROM edges",
        "edges" -> edges)
    }
  }

  test("rejects mismatched column sets") {
    val edges = df(Seq((1L, 1L)))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        edges.select(edges("l").as("wrong_name")),
        "SELECT l FROM edges",
        "edges" -> edges)
    }
  }

  test("rejects differing row contents at equal cardinality") {
    val edges = df(Seq((1L, 10L), (2L, 20L)))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        edges.select(edges("r").as("l")), // same shape, wrong values
        "SELECT l FROM edges",
        "edges" -> edges)
    }
  }
}
