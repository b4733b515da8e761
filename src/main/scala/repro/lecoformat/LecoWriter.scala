package repro.lecoformat

import java.io.File
import org.apache.spark.sql.DataFrame
import org.apache.spark.TaskContext

/** Writes a DataFrame of integer-typed columns to a `leco` table directory,
  * one part file per Spark partition — the encode runs inside executor
  * tasks, per column chunk, matching the repro target of applying LeCo
  * during columnar encode in the executors.
  */
object LecoWriter {

  /** All columns must be integral (or date/timestamp-like castable to long). */
  def write(df: DataFrame, dir: String, encoding: Encoding,
            partSize: Int = 1024, zstd: Boolean = false,
            rowGroupRows: Int = 1 << 20): Unit = {
    val out = new File(dir)
    if (out.exists()) {
      out.listFiles().foreach(_.delete())
    } else require(out.mkdirs(), s"cannot create $dir")
    val cols = df.columns.toSeq
    val longDf = df.selectExpr(cols.map(c => s"CAST(`$c` AS BIGINT) AS `$c`"): _*)
    longDf.foreachPartition { (rows: Iterator[org.apache.spark.sql.Row]) =>
      val pid = TaskContext.getPartitionId()
      val f = new File(dir, f"part-$pid%05d.leco")
      val w = new LecoFileWriter(f, cols, encoding, partSize, zstd, rowGroupRows)
      val buf = new Array[Long](cols.size)
      rows.foreach { r =>
        var c = 0
        while (c < buf.length) { buf(c) = r.getLong(c); c += 1 }
        w.addRow(buf)
      }
      w.close()
    }
  }
}
