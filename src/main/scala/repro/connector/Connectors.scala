package repro.connector

import java.sql.DriverManager
import scala.collection.mutable
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.types._
import repro.core.{DatabaseConnector, LanguageConfig, LocalResult}
import repro.core.languages.Languages
import repro.cypher.MiniCypher
import repro.mongo.MiniMongo
import repro.util.{JArr, Json}

/** Spark SQL connector — the primary retarget of this reproduction.
  * Collections are registered as temp views; generated nested SQL text is
  * executed by Catalyst via `spark.sql`, which collapses the per-operation
  * subqueries during optimization (the paper's "efficient query
  * optimizer" requirement).
  */
final class SparkSqlConnector(val spark: SparkSession,
                              override val lang: LanguageConfig = Languages.sparkSql)
    extends DatabaseConnector {
  override def name = "PolyFrame-SparkSQL"
  private val schemas = mutable.Map.empty[String, Seq[String]]

  override def initialize(namespace: String, collection: String, data: DataFrame): Unit = {
    data.createOrReplaceTempView(collection)
    schemas(collection) = data.columns.toSeq
  }

  /** The un-collected DataFrame for a query — used by tests to hand the
    * result straight to the DuckDB oracle.
    */
  def dataFrame(query: String): DataFrame = spark.sql(query)

  override def execute(query: String, baseCollection: String): LocalResult =
    LocalResult.fromDF(spark.sql(query))
}

/** DuckDB connector — executes the PostgreSQL-flavoured SQL rules on an
  * in-process DuckDB (the stand-in for PostgreSQL; `threads` stands in
  * for Greenplum parallelism). Namespaces map to DuckDB schemas, so
  * `SELECT * FROM Test.Users` works as generated.
  */
final class DuckDbConnector(threads: Int = 1,
                            override val lang: LanguageConfig = Languages.sql)
    extends DatabaseConnector with AutoCloseable {
  override def name = "PolyFrame-DuckDB"
  Class.forName("org.duckdb.DuckDBDriver")
  val conn: java.sql.Connection = DriverManager.getConnection("jdbc:duckdb:")
  conn.createStatement().execute(s"SET threads TO $threads")

  private def sqlType(dt: DataType): String = dt match {
    case LongType            => "BIGINT"
    case IntegerType         => "INTEGER"
    case ShortType           => "SMALLINT"
    case DoubleType          => "DOUBLE"
    case FloatType           => "FLOAT"
    case BooleanType         => "BOOLEAN"
    case _: DecimalType      => "DOUBLE"
    case DateType            => "VARCHAR"
    case _                   => "VARCHAR"
  }

  override def initialize(namespace: String, collection: String, data: DataFrame): Unit = {
    val st = conn.createStatement()
    st.execute(s"CREATE SCHEMA IF NOT EXISTS $namespace")
    val cols = data.schema.fields.map(f => s""""${f.name}" ${sqlType(f.dataType)}""").mkString(", ")
    st.execute(s"""DROP TABLE IF EXISTS $namespace."$collection"""")
    st.execute(s"""CREATE TABLE $namespace."$collection" ($cols)""")
    val rows = data.collect()
    try copyLoad(namespace, collection, data, rows)
    catch { case _: Exception => batchLoad(namespace, collection, data, rows) }
    st.close()
  }

  /** Fast path: spill to CSV and `COPY` (DuckDB's bulk loader). */
  private def copyLoad(namespace: String, collection: String,
                       data: DataFrame, rows: Array[org.apache.spark.sql.Row]): Unit = {
    val tmp = java.nio.file.Files.createTempFile("duckload", ".csv")
    try {
      val w = java.nio.file.Files.newBufferedWriter(tmp)
      try rows.foreach { r =>
        var i = 0
        while (i < data.columns.length) {
          if (i > 0) w.write(',')
          r.get(i) match {
            case null      => // empty field = NULL
            case s: String => w.write('"'); w.write(s.replace("\"", "\"\"")); w.write('"')
            case v         => w.write(v.toString)
          }
          i += 1
        }
        w.write('\n')
      } finally w.close()
      conn.createStatement().execute(
        s"""COPY $namespace."$collection" FROM '${tmp.toAbsolutePath}' (HEADER false, NULL '')""")
    } finally java.nio.file.Files.deleteIfExists(tmp)
  }

  /** Fallback: transactional prepared-statement batches. */
  private def batchLoad(namespace: String, collection: String,
                        data: DataFrame, rows: Array[org.apache.spark.sql.Row]): Unit = {
    val ps = conn.prepareStatement(
      s"""INSERT INTO $namespace."$collection" VALUES (${data.columns.map(_ => "?").mkString(",")})""")
    conn.setAutoCommit(false)
    var n = 0
    rows.foreach { r =>
      data.columns.indices.foreach { i =>
        r.get(i) match {
          case null          => ps.setNull(i + 1, java.sql.Types.INTEGER)
          case v: Long       => ps.setLong(i + 1, v)
          case v: Int        => ps.setInt(i + 1, v)
          case v: Double     => ps.setDouble(i + 1, v)
          case v: Boolean    => ps.setBoolean(i + 1, v)
          case v: String     => ps.setString(i + 1, v)
          case other         => ps.setString(i + 1, other.toString)
        }
      }
      ps.addBatch(); n += 1
      if (n % 10000 == 0) ps.executeBatch()
    }
    ps.executeBatch(); ps.close()
    conn.commit()
    conn.setAutoCommit(true)
  }

  override def execute(query: String, baseCollection: String): LocalResult = {
    val rs   = conn.createStatement().executeQuery(query)
    val meta = rs.getMetaData
    val cols = (1 to meta.getColumnCount).map(meta.getColumnLabel)
    val rows = Iterator.continually(rs).takeWhile(_.next())
      .map(r => cols.indices.map(i => LocalResult.normalize(r.getObject(i + 1))))
      .toVector
    LocalResult(cols, rows)
  }

  override def close(): Unit = conn.close()
}

/** MongoDB connector — pre-processing wraps the comma-separated pipeline
  * stages into an `aggregate([...])` JSON array which MiniMongo executes
  * against the base collection. Per the paper, MongoDB's fast metadata
  * count is NOT available through the aggregation pipeline, so
  * `countMetadata` stays None.
  */
final class MongoConnector(val spark: SparkSession,
                           override val lang: LanguageConfig = Languages.mongo)
    extends DatabaseConnector {
  override def name = "PolyFrame-MiniMongo"
  private val collections = mutable.Map.empty[String, DataFrame]

  override def initialize(namespace: String, collection: String, data: DataFrame): Unit =
    collections(collection) = data

  override def preProcess(query: String, baseCollection: String): String = s"[ $query ]"

  /** The un-collected DataFrame for a pipeline — for oracle-based tests. */
  def dataFrame(query: String, baseCollection: String): DataFrame = {
    val pipeline = Json.parse(preProcess(query, baseCollection)).asInstanceOf[JArr]
    MiniMongo.run(collections(baseCollection), pipeline, collections(_))
  }

  override def execute(query: String, baseCollection: String): LocalResult = {
    val pipeline = Json.parse(query).asInstanceOf[JArr]
    LocalResult.fromDF(MiniMongo.run(collections(baseCollection), pipeline, collections(_)))
  }

  /** Strip MongoDB's internal `_id` if a pipeline ever leaks it. */
  override def postProcess(result: LocalResult): LocalResult = {
    val idx = result.columns.indexOf("_id")
    if (idx < 0) result
    else LocalResult(result.columns.patch(idx, Nil, 1), result.rows.map(_.patch(idx, Nil, 1)))
  }
}

/** Cypher/Neo4j connector — MiniCypher executes the generated Cypher on
  * Spark. Like Neo4j, it maintains a nodes-count metadata store per label
  * (filled at load time), which serves `len(df)` on an untransformed
  * frame instantly — the paper's expression-1 fast path.
  */
final class CypherConnector(val spark: SparkSession,
                            override val lang: LanguageConfig = Languages.cypher)
    extends DatabaseConnector {
  override def name = "PolyFrame-MiniCypher"
  private val collections = mutable.Map.empty[String, DataFrame]
  private val counts      = mutable.Map.empty[String, Long]

  override def initialize(namespace: String, collection: String, data: DataFrame): Unit = {
    collections(collection) = data
    counts(collection) = data.count() // Neo4j maintains its counts store at write time
  }

  /** The un-collected DataFrame for a query — for oracle-based tests. */
  def dataFrame(query: String): DataFrame = MiniCypher.run(query, collections(_))

  override def execute(query: String, baseCollection: String): LocalResult =
    LocalResult.fromDF(MiniCypher.run(query, collections(_)))

  override def countMetadata(collection: String): Option[Long] = counts.get(collection)
}
