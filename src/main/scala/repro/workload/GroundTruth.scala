package repro.workload

import java.nio.file.{Files, Path}
import java.sql.{Connection, DriverManager}

import org.apache.spark.sql.DataFrame
import repro.core.Query

/** Exact query answers via DuckDB over Spark-written Parquet.
  *
  * The paper used SQLite for ground truth (306 s median per query at 1 B
  * rows); DuckDB over Parquet gives the same exact answers in milliseconds
  * at our scale, and the repo's Oracle already trusts DuckDB for result
  * equality. One view per dataset; all queries run against the view.
  */
final class GroundTruth private (val conn: Connection, val table: String) extends AutoCloseable {

  /** Exact scalar answer; None when the aggregate is NULL (empty selection). */
  def answer(q: Query): Option[Double] = {
    require(q.groupBy.isEmpty, "use answerGroups for GROUP BY")
    val rs = conn.createStatement().executeQuery(q.toSql(table))
    try {
      if (!rs.next()) None
      else Option(rs.getObject("result")).map(_.asInstanceOf[Number].doubleValue)
    } finally rs.close()
  }

  def answerGroups(q: Query): Map[String, Double] = {
    val rs = conn.createStatement().executeQuery(q.toSql(table))
    try {
      Iterator
        .continually(rs)
        .takeWhile(_.next())
        .flatMap { r =>
          val g = Option(r.getObject("grp")).map(_.toString)
          val v = Option(r.getObject("result")).map(_.asInstanceOf[Number].doubleValue)
          for (gg <- g; vv <- v) yield gg -> vv
        }
        .toMap
    } finally rs.close()
  }

  /** Exact COUNT of rows satisfying a predicate (selectivity filtering). */
  def count(whereSql: Option[String]): Long = {
    val sql = s"SELECT count(*) AS c FROM $table" + whereSql.map(w => s" WHERE $w").getOrElse("")
    val rs = conn.createStatement().executeQuery(sql)
    try { rs.next(); rs.getLong("c") } finally rs.close()
  }

  override def close(): Unit = conn.close()
}

object GroundTruth {

  /** Write `df` as Parquet under a temp dir and expose it as a DuckDB view. */
  def forDataFrame(df: DataFrame, table: String): GroundTruth = {
    val dir: Path = Files.createTempDirectory(s"gt_$table")
    val out = dir.resolve("data").toString
    df.write.mode("overwrite").parquet(out)
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    conn.createStatement().execute(
      s"CREATE VIEW $table AS SELECT * FROM read_parquet('$out/*.parquet')"
    )
    new GroundTruth(conn, table)
  }
}
