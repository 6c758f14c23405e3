package repro.workloads

import repro.{Oracle, SparkSpec, SynthData}
import org.apache.spark.sql.functions._

class WordCountSpec extends SparkSpec {

  private lazy val lines = SynthData.textLines(spark, lines = 3000, wordsPerLine = 6,
    vocab = 80, seed = 6).cache()

  test("word counts match the DuckDB oracle") {
    Oracle.assertEquivalent(WordCountW.wordCounts(lines), WordCountW.oracleSql,
      "text" -> lines)
  }

  test("total count equals lines x words per line") {
    val total = WordCountW.wordCounts(lines).agg(sum("cnt")).collect()(0).getLong(0)
    assert(total == 3000L * 6)
  }

  test("vocabulary is bounded by the generator's dictionary") {
    val words = WordCountW.wordCounts(lines).count()
    assert(words <= 80 && words > 40)
  }

  test("counts are deterministic in the generator seed") {
    val again = SynthData.textLines(spark, 3000, 6, 80, seed = 6)
    val a = WordCountW.wordCounts(lines).orderBy("word").collect().toSeq
    val b = WordCountW.wordCounts(again).orderBy("word").collect().toSeq
    assert(a == b)
  }
}
