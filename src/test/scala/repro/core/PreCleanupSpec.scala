package repro.core

import repro.SparkSpec
import repro.blocking.Blocking

class PreCleanupSpec extends SparkSpec {

  import spark.implicits._

  private def edges(rows: (Long, Long, Seq[String])*) =
    rows.toDF("src", "dst", "blockings")

  private def pairsOf(df: org.apache.spark.sql.DataFrame): Set[(Long, Long)] =
    df.select("src", "dst").collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  test("small components keep all edges") {
    val e = edges((1L, 2L, Seq(Blocking.TokenOverlap)), (2L, 3L, Seq(Blocking.IdOverlap)))
    assert(pairsOf(PreCleanup.run(spark, e, maxComponent = 50)) == Set((1L, 2L), (2L, 3L)))
  }

  test("token-only edges are dropped inside big components") {
    // chain of 6 > maxComponent 5
    val chain = (1L to 5L).map(i => (i, i + 1,
      if (i % 2 == 0) Seq(Blocking.TokenOverlap) else Seq(Blocking.IdOverlap)))
    val out = PreCleanup.run(spark, edges(chain: _*), maxComponent = 5)
    assert(pairsOf(out) == Set((1L, 2L), (3L, 4L), (5L, 6L)))
  }

  test("edges with id-overlap provenance survive in big components") {
    val chain = (1L to 6L).map(i => (i, i + 1, Seq(Blocking.IdOverlap)))
    val out = PreCleanup.run(spark, edges(chain: _*), maxComponent = 5)
    assert(out.count() == 6)
  }

  test("mixed-provenance edges survive (token + id)") {
    val chain = (1L to 6L).map(i =>
      (i, i + 1, Seq(Blocking.TokenOverlap, Blocking.IdOverlap)))
    val out = PreCleanup.run(spark, edges(chain: _*), maxComponent = 5)
    assert(out.count() == 6)
  }

  test("issuer-match provenance also survives") {
    val chain = (1L to 6L).map(i => (i, i + 1, Seq(Blocking.IssuerMatch)))
    assert(PreCleanup.run(spark, edges(chain: _*), maxComponent = 5).count() == 6)
  }

  test("only the oversized component is affected") {
    val big   = (1L to 6L).map(i => (i, i + 1, Seq(Blocking.TokenOverlap)))
    val small = Seq((100L, 101L, Seq(Blocking.TokenOverlap)))
    val out = PreCleanup.run(spark, edges((big ++ small): _*), maxComponent = 5)
    assert(pairsOf(out) == Set((100L, 101L)))
  }

  test("empty input stays empty") {
    val e = edges()
    assert(PreCleanup.run(spark, e, maxComponent = 5).count() == 0)
  }

  test("output schema keeps the blockings column") {
    val e = edges((1L, 2L, Seq(Blocking.IdOverlap)))
    assert(PreCleanup.run(spark, e).columns.toSet == Set("src", "dst", "blockings"))
  }
}
