package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.data.Tables
import repro.sparkglue.ColumnCompress

/** §4.5 (Fig 12): per-table compression ratios of five schemes over the
  * nine multi-column tables, each sorted by its primary key. Encoding runs
  * per column chunk inside Spark executors (one chunk per DataFrame
  * partition). Also reports the sortedness metric and the TPC-H
  * high-cardinality (NDV > 10% of rows) subset.
  */
object MultiColumnBench {

  val Codecs: Seq[String] = Seq("FOR", "Delta-fix", "Delta-var", "LeCo-fix", "LeCo-var")

  final case class TableRow(table: String, sortedness: Double, nRows: Long,
                            ratios: Map[String, Double])

  def run(spark: SparkSession, sf: Double = 0.02): Seq[TableRow] =
    Tables.all(spark, sf).map { spec =>
      val df = spec.df.cache()
      val cols = df.columns.toSeq
      val nRows = df.count()
      val stats = Codecs.map { c =>
        val perCol = cols.map(col => ColumnCompress.compressColumn(df, col, c))
        val raw  = perCol.map(_.nValues * 8L).sum
        val comp = perCol.map(_.compressedBytes).sum
        c -> (comp.toDouble / raw, perCol)
      }.toMap
      // sortedness: 1 - (adjacent inversions / values), averaged over columns
      val invStats = stats(Codecs.head)._2
      val sortedness = invStats.map(s => 1.0 - s.inversions.toDouble / math.max(1, s.nValues)).sum / cols.size
      val row = TableRow(spec.name, sortedness, nRows, stats.map { case (k, v) => k -> v._1 })
      df.unpersist()
      row
    }

  /** High-cardinality subset (NDV > 10% rows) for a single table — the
    * paper's Fig 12 bottom-left over TPC-H.
    */
  def highCardinality(spark: SparkSession, sf: Double = 0.02): Seq[TableRow] =
    Tables.all(spark, sf).filter(t => Set("lineitem", "partsupp", "orders")(t.name)).map { spec =>
      val df = spec.df.cache()
      val nRows = df.count()
      val cols = df.columns.toSeq.filter(c => ColumnCompress.ndv(df, c) * 10 > nRows)
      val ratios = Codecs.map { c =>
        val perCol = cols.map(col => ColumnCompress.compressColumn(df, col, c))
        c -> perCol.map(_.compressedBytes).sum.toDouble / perCol.map(_.nValues * 8L).sum
      }.toMap
      df.unpersist()
      TableRow(spec.name, 0.0, nRows, ratios)
    }

  def format(rows: Seq[TableRow]): String = {
    val sb = new StringBuilder
    sb ++= f"${"table"}%-14s ${"sorted"}%7s ${"rows"}%9s " + Codecs.map(c => f"$c%10s").mkString(" ") + "\n"
    for (r <- rows)
      sb ++= f"${r.table}%-14s ${r.sortedness}%7.3f ${r.nRows}%9d " +
             Codecs.map(c => f"${r.ratios(c) * 100}%9.2f%%").mkString(" ") + "\n"
    sb.toString
  }
}
