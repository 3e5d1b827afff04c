package repro.core

import org.apache.spark.sql.DataFrame

/** Connector that never executes — for pure query-formation tests. */
final class NullConnector(override val lang: LanguageConfig) extends DatabaseConnector {
  override def name = s"null-${lang.name}"
  override def initialize(namespace: String, collection: String, data: DataFrame): Unit = ()
  override def execute(query: String, baseCollection: String): LocalResult =
    throw new UnsupportedOperationException(s"NullConnector cannot execute: $query")
}

object TestSupport {
  /** Whitespace-insensitive comparison form for generated queries. */
  def norm(s: String): String = s.replaceAll("\\s+", " ").trim

  def frame(lang: LanguageConfig, namespace: String = "Test",
            collection: String = "Users"): PolyFrame =
    PolyFrame(new NullConnector(lang), namespace, collection,
              Seq("lang", "name", "address"))
}
