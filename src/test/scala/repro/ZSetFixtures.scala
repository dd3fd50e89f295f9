package repro

import org.apache.spark.sql.DataFrame

import repro.zset.ZSet

/** Small in-line Z-set builders for tests. */
trait ZSetFixtures { self: SparkSpec =>

  /** Z-set over one long column from (value, weight) pairs. */
  def zs1(col: String, entries: (Long, Long)*): ZSet = {
    val spark = self.spark
    import spark.implicits._
    ZSet.raw(entries.toSeq.toDF(col, ZSet.W))
  }

  /** Z-set over two long columns from ((v1, v2), weight) pairs. */
  def zs2(c1: String, c2: String, entries: ((Long, Long), Long)*): ZSet = {
    val spark = self.spark
    import spark.implicits._
    ZSet.raw(entries.toSeq.map { case ((a, b), w) => (a, b, w) }.toDF(c1, c2, ZSet.W))
  }

  /** Z-set over one string column from (value, weight) pairs. */
  def zsS(col: String, entries: (String, Long)*): ZSet = {
    val spark = self.spark
    import spark.implicits._
    ZSet.raw(entries.toSeq.toDF(col, ZSet.W))
  }

  /** Plain one-column long DataFrame. */
  def df1(col: String, values: Long*): DataFrame = {
    val spark = self.spark
    import spark.implicits._
    values.toSeq.toDF(col)
  }

  /** Canonical entries for equality assertions. */
  def entriesOf(z: ZSet): Set[(Seq[String], Long)] = z.entries().toSet
}
