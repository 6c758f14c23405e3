package repro.workloads

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** The WordCount benchmark (paper Table 2, Map-and-Reduce class): the real
  * Spark computation whose resource footprint `AppModel.wordCount` models.
  */
object WordCountW {

  /** word → count over a corpus of space-separated lines. */
  def wordCounts(lines: DataFrame): DataFrame =
    lines
      .select(explode(split(col("line"), " ")) as "word")
      .groupBy("word")
      .agg(count(lit(1)) as "cnt")

  /** DuckDB-equivalent SQL over a `text(line)` table (same tokenization). */
  val oracleSql: String =
    "SELECT word, COUNT(*) AS cnt FROM " +
      "(SELECT UNNEST(string_split(line, ' ')) AS word FROM text) GROUP BY word"
}
