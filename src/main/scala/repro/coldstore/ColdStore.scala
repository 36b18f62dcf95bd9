package repro.coldstore

import org.apache.hadoop.conf.Configuration
import org.apache.hadoop.fs.Path
import org.apache.parquet.hadoop.ParquetFileReader
import org.apache.parquet.hadoop.util.HadoopInputFile
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import scala.jdk.CollectionConverters._

import repro.scan.{ColumnChunk, ParquetFile, RowGroup}

/** Per-file statistics of the cold store: the min/max index the paper's scan
  * operator reads from the Parquet footer (Section 4.3.2), at file
  * granularity for driver-side pruning.
  */
final case class FileStat(
    path: String,
    bytes: Long,
    rows: Long,
    minShipdateDays: Int,
    maxShipdateDays: Int,
)

/** The "cold data on S3" substrate: LINEITEM sorted globally by `l_shipdate`
  * and written into many gzip-compressed Parquet files on the local
  * filesystem (our S3 stand-in), exactly as the paper lays out its SF 1000
  * dataset (Section 5.1). Provides the footer catalog, min/max file pruning,
  * and a bridge that turns the *real* files into the scan model's
  * `ParquetFile` layout so the simulator runs on measured row-group and
  * column-chunk sizes.
  */
object ColdStore {

  /** SynthData's shipdate domain: 1992-01-01 + [0, 2557) days. */
  private val EpochDay: Long = java.time.LocalDate.parse("1992-01-01").toEpochDay
  private val SpanDays: Double = 2557.0

  /** Normalize a date (days since Unix epoch) to the [0, 1] key domain. */
  def normalizeDays(days: Int): Double = (days - EpochDay) / SpanDays

  /** Write `lineitem` sorted by `l_shipdate` into `nFiles` gzip Parquet files. */
  def write(lineitem: DataFrame, path: String, nFiles: Int): Unit = {
    require(nFiles >= 1, "need at least one file")
    lineitem
      .repartitionByRange(nFiles, col("l_shipdate"))
      .sortWithinPartitions("l_shipdate")
      .write
      .mode("overwrite")
      .option("compression", "gzip")
      .parquet(path)
  }

  /** Data files of a cold store directory, sorted by name. */
  def listFiles(path: String): Vector[String] = {
    val dir = new java.io.File(path)
    require(dir.isDirectory, s"$path is not a directory")
    dir.listFiles((_, n) => n.endsWith(".parquet")).map(_.getAbsolutePath).sorted.toVector
  }

  private def withFooter[A](file: String)(f: ParquetFileReader => A): A = {
    val reader = ParquetFileReader.open(
      HadoopInputFile.fromPath(new Path(file), new Configuration()))
    try f(reader) finally reader.close()
  }

  /** Build the file-stats catalog by reading only Parquet footers. */
  def catalog(path: String): Vector[FileStat] =
    listFiles(path).map { file =>
      withFooter(file) { reader =>
        val blocks = reader.getFooter.getBlocks.asScala.toVector
        val rows   = blocks.map(_.getRowCount).sum
        val shipCols = blocks.flatMap(_.getColumns.asScala)
          .filter(_.getPath.toDotString == "l_shipdate")
        val mins = shipCols.flatMap(c => statAsDays(c.getStatistics.genericGetMin))
        val maxs = shipCols.flatMap(c => statAsDays(c.getStatistics.genericGetMax))
        FileStat(
          path = file,
          bytes = new java.io.File(file).length(),
          rows = rows,
          minShipdateDays = if (mins.isEmpty) Int.MinValue else mins.min,
          maxShipdateDays = if (maxs.isEmpty) Int.MaxValue else maxs.max,
        )
      }
    }

  private def statAsDays(v: Any): Option[Int] = v match {
    case i: java.lang.Integer => Some(i.intValue)
    case _                    => None
  }

  /** Files that may contain shipdates in [lo, hi] (ISO dates, conservative). */
  def pruneFiles(stats: Seq[FileStat], lo: String, hi: String): Seq[FileStat] = {
    val loD = java.time.LocalDate.parse(lo).toEpochDay
    val hiD = java.time.LocalDate.parse(hi).toEpochDay
    stats.filter(s => s.maxShipdateDays >= loD && s.minShipdateDays <= hiD)
  }

  /** Result of a driver-side pruned scan. */
  final case class PruneStats(totalFiles: Int, survivingFiles: Int) {
    def prunedFraction: Double =
      if (totalFiles == 0) 0.0 else (totalFiles - survivingFiles).toDouble / totalFiles
  }

  /** Read only the files whose min/max range overlaps [lo, hi]. The caller
    * still applies the exact predicate — pruning is conservative.
    */
  def prunedScan(spark: SparkSession, path: String, lo: String, hi: String)
      : (DataFrame, PruneStats) = {
    val stats     = catalog(path)
    val surviving = pruneFiles(stats, lo, hi)
    val pruneInfo = PruneStats(stats.size, surviving.size)
    val df =
      if (surviving.isEmpty) {
        spark.read.parquet(path).limit(0)
      } else spark.read.parquet(surviving.map(_.path): _*)
    (df, pruneInfo)
  }

  /** Bridge: the real files as the scan model's layout, with *measured*
    * row-group boundaries, min/max keys, and compressed column-chunk sizes.
    */
  def layout(path: String): Vector[ParquetFile] =
    listFiles(path).map { file =>
      withFooter(file) { reader =>
        val blocks = reader.getFooter.getBlocks.asScala.toVector
        val rgs = blocks.map { b =>
          val cols = b.getColumns.asScala.toVector
          val ship = cols.find(_.getPath.toDotString == "l_shipdate")
          val lo = ship.flatMap(c => statAsDays(c.getStatistics.genericGetMin))
            .map(normalizeDays).getOrElse(0.0)
          val hi = ship.flatMap(c => statAsDays(c.getStatistics.genericGetMax))
            .map(normalizeDays).getOrElse(1.0)
          RowGroup(lo, hi,
            cols.map(c => ColumnChunk(c.getPath.toDotString, c.getTotalSize)))
        }
        ParquetFile(file, rgs)
      }
    }

  /** Measured per-column fraction of compressed bytes across a layout. */
  def columnFractions(layout: Seq[ParquetFile]): Map[String, Double] = {
    val byCol = layout.flatMap(_.rowGroups).flatMap(_.chunks)
      .groupMapReduce(_.column)(_.bytes)(_ + _)
    val total = byCol.values.sum.toDouble
    require(total > 0, "empty layout")
    byCol.map { case (c, b) => c -> b / total }
  }
}
