package repro

import org.apache.spark.sql.DataFrame
import repro.core.{Isax, SeriesRecord}
import repro.spark.{DistributedIndex, EngineFactory, IndexConfig}

/** End-to-end correctness of the z-normalized ED 1-NN pipeline against a
  * DuckDB oracle: the whole query (z-normalization, distance, argmin) is
  * expressed in SQL over exploded (id, pos, val) tables and diffed against the
  * engines' results.
  */
class OracleNnSpec extends SparkSpec {

  private val n = 32
  private val nSeries = 60
  private val nQueries = 4

  private lazy val data = TestData.dataset(300, nSeries, n)
  private lazy val queries = {
    val r = TestData.rng(301)
    Array.tabulate(nQueries)(i => (i.toLong, TestData.mixedSeries(r, n)))
  }

  private def explodeDf(rows: Array[(Long, Array[Float])], idCol: String): DataFrame = {
    import spark.implicits._
    rows.flatMap { case (id, vs) =>
      vs.zipWithIndex.map { case (v, pos) => (id, pos, v.toDouble) }
    }.toIndexedSeq.toDF(idCol, "pos", "val")
  }

  /** SQL computing the exact z-ED 1-NN for every query, all inside DuckDB. */
  private val oracleSql =
    """
    WITH sz AS (
      SELECT CAST(id AS BIGINT) AS id, CAST(pos AS INT) AS pos,
             CASE WHEN STDDEV_POP(CAST(val AS DOUBLE)) OVER w < 1e-12 THEN 0.0
                  ELSE (CAST(val AS DOUBLE) - AVG(CAST(val AS DOUBLE)) OVER w)
                       / STDDEV_POP(CAST(val AS DOUBLE)) OVER w END AS z
      FROM data WINDOW w AS (PARTITION BY id)
    ), qz AS (
      SELECT CAST(qid AS BIGINT) AS qid, CAST(pos AS INT) AS pos,
             CASE WHEN STDDEV_POP(CAST(val AS DOUBLE)) OVER w < 1e-12 THEN 0.0
                  ELSE (CAST(val AS DOUBLE) - AVG(CAST(val AS DOUBLE)) OVER w)
                       / STDDEV_POP(CAST(val AS DOUBLE)) OVER w END AS z
      FROM query WINDOW w AS (PARTITION BY qid)
    ), dist AS (
      SELECT q.qid, s.id, SUM((s.z - q.z) * (s.z - q.z)) AS dsq
      FROM sz s JOIN qz q USING (pos)
      GROUP BY q.qid, s.id
    ), ranked AS (
      SELECT qid, id, dsq, ROW_NUMBER() OVER (PARTITION BY qid ORDER BY dsq, id) AS rn
      FROM dist
    )
    SELECT qid, id AS nnid FROM ranked WHERE rn = 1
    """

  private def resultDf(results: Seq[(Long, Long)]): DataFrame = {
    import spark.implicits._
    results.toDF("qid", "nnid")
  }

  private def check(engineResults: Seq[(Long, Long)]): Unit =
    Oracle.assertEquivalent(
      resultDf(engineResults),
      oracleSql,
      "data" -> explodeDf(data, "id"),
      "query" -> explodeDf(queries.map { case (qid, vs) => (qid, vs) }, "qid"),
    )

  private def toDs = {
    import spark.implicits._
    spark.createDataset(data.map { case (id, v) => SeriesRecord(id, v) }.toIndexedSeq)
  }

  test("brute-force reference matches the DuckDB oracle") {
    check(queries.toIndexedSeq.map { case (qid, q) =>
      (qid, TestData.bruteKnn(data.toIndexedSeq, q, 1).head._1)
    })
  }

  test("MESSI-style distributed index matches the DuckDB oracle") {
    val idx = DistributedIndex.build("MESSI", toDs, Isax.space(n, 8, 256), 16, 3)
    try check(queries.toIndexedSeq.map { case (qid, q) => (qid, idx.search(q, 1).head._1) })
    finally idx.close()
  }

  test("SOFA engine matches the DuckDB oracle") {
    val sofa = EngineFactory.sofa(toDs, n, IndexConfig(leafCapacity = 16, partitions = 3, sampleRate = 0.5))
    try check(queries.toIndexedSeq.map { case (qid, q) => (qid, sofa.search(q, 1).head._1) })
    finally sofa.close()
  }

  test("UCR scan matches the DuckDB oracle") {
    val ucr = EngineFactory.ucr(toDs, 3)
    try check(queries.toIndexedSeq.map { case (qid, q) => (qid, ucr.search(q, 1).head._1) })
    finally ucr.close()
  }

  test("FAISS-flat matches the DuckDB oracle") {
    val faiss = EngineFactory.faiss(toDs, 3)
    try check(queries.toIndexedSeq.map { case (qid, q) => (qid, faiss.search(q, 1).head._1) })
    finally faiss.close()
  }

  test("z-ED distances themselves match the DuckDB oracle (rounded)") {
    import spark.implicits._
    val got = queries.toIndexedSeq.map { case (qid, q) =>
      val (nnid, d) = TestData.bruteKnn(data.toIndexedSeq, q, 1).head
      (qid, nnid, BigDecimal(d).setScale(3, BigDecimal.RoundingMode.HALF_UP).toDouble)
    }.toDF("qid", "nnid", "dist")
    val sql = oracleSql.replace(
      "SELECT qid, id AS nnid FROM ranked WHERE rn = 1",
      "SELECT qid, id AS nnid, ROUND(SQRT(dsq), 3) AS dist FROM ranked WHERE rn = 1")
    Oracle.assertEquivalent(got, sql,
      "data" -> explodeDf(data, "id"),
      "query" -> explodeDf(queries.map { case (qid, vs) => (qid, vs) }, "qid"))
  }
}
