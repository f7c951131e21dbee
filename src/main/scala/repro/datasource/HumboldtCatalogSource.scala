package repro.datasource

import java.util
import scala.jdk.CollectionConverters._

import org.apache.hadoop.conf.Configuration
import org.apache.hadoop.fs.Path
import org.apache.parquet.hadoop.ParquetFileReader
import org.apache.parquet.hadoop.util.HadoopInputFile
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.connector.catalog.{SupportsRead, Table, TableCapability, TableProvider}
import org.apache.spark.sql.connector.expressions.Transform
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.sources.DataSourceRegister
import org.apache.spark.sql.types._
import org.apache.spark.sql.util.CaseInsensitiveStringMap
import org.apache.spark.unsafe.types.UTF8String

/** DataSourceV2 that turns a parquet *lake* into a *metadata catalog*.
  *
  * `spark.read.format("humboldt-catalog").load(lakeRoot)` yields one row per
  * dataset directory under `lakeRoot`, with metadata extracted from the
  * files themselves (parquet footers — no data pages are read):
  *
  * {{{
  * name          STRING   dataset (directory) name
  * path          STRING   absolute dataset path
  * num_files     INT      parquet file count
  * size_bytes    LONG     total on-disk bytes
  * modified_at   LONG     max file mtime, epoch millis
  * row_count     LONG     sum of footer block row counts
  * num_columns   INT      field count of the parquet schema
  * columns       STRING   comma-joined column names
  * }}}
  *
  * This is the lake-facing half of the substitution described in DESIGN.md:
  * where the paper's providers query a SaaS metadata service, ours can also
  * *derive* descriptive metadata straight from the data lake. One input
  * partition per dataset, so extraction scales with the cluster; column
  * pruning is pushed down so `select(name)` never opens a footer.
  */
final class HumboldtCatalogSource extends TableProvider with DataSourceRegister {
  override def shortName(): String = "humboldt-catalog"

  override def inferSchema(options: CaseInsensitiveStringMap): StructType =
    HumboldtCatalogTable.Schema

  override def getTable(schema: StructType, partitioning: Array[Transform],
                        properties: util.Map[String, String]): Table = {
    val path = Option(properties.get("path"))
      .getOrElse(throw new IllegalArgumentException(
        "humboldt-catalog requires a path — use .load(<lake root>)"))
    new HumboldtCatalogTable(path)
  }
}

object HumboldtCatalogTable {
  val Schema: StructType = StructType(Seq(
    StructField("name", StringType, nullable = false),
    StructField("path", StringType, nullable = false),
    StructField("num_files", IntegerType, nullable = false),
    StructField("size_bytes", LongType, nullable = false),
    StructField("modified_at", LongType, nullable = false),
    StructField("row_count", LongType, nullable = false),
    StructField("num_columns", IntegerType, nullable = false),
    StructField("columns", StringType, nullable = false),
  ))

  /** Columns computable from directory listing alone (no footer reads). */
  val ListingOnlyColumns: Set[String] = Set("name", "path", "num_files", "size_bytes", "modified_at")
}

final class HumboldtCatalogTable(lakeRoot: String) extends Table with SupportsRead {
  override def name(): String = s"humboldt-catalog($lakeRoot)"
  override def schema(): StructType = HumboldtCatalogTable.Schema
  override def capabilities(): util.Set[TableCapability] =
    util.EnumSet.of(TableCapability.BATCH_READ)

  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder =
    new HumboldtCatalogScanBuilder(lakeRoot)
}

final class HumboldtCatalogScanBuilder(lakeRoot: String)
    extends ScanBuilder with SupportsPushDownRequiredColumns {
  private var required: StructType = HumboldtCatalogTable.Schema

  override def pruneColumns(requiredSchema: StructType): Unit = {
    // Preserve source column order regardless of the requested order.
    val want = requiredSchema.fieldNames.toSet
    required = StructType(HumboldtCatalogTable.Schema.filter(f => want.contains(f.name)))
  }

  override def build(): Scan = new HumboldtCatalogScan(lakeRoot, required)
}

final class HumboldtCatalogScan(lakeRoot: String, required: StructType) extends Scan with Batch {
  override def readSchema(): StructType = required
  override def toBatch: Batch = this

  override def planInputPartitions(): Array[InputPartition] = {
    val fs   = new Path(lakeRoot).getFileSystem(new Configuration())
    val root = fs.getFileStatus(new Path(lakeRoot))
    require(root.isDirectory, s"lake root $lakeRoot is not a directory")
    fs.listStatus(root.getPath)
      .filter(_.isDirectory)
      .map(st => DatasetPartition(st.getPath.getName, st.getPath.toString): InputPartition)
      .sortBy { case DatasetPartition(n, _) => n }
  }

  override def createReaderFactory(): PartitionReaderFactory =
    new HumboldtCatalogReaderFactory(required)
}

/** One dataset directory — the unit of parallel metadata extraction. */
final case class DatasetPartition(datasetName: String, datasetPath: String) extends InputPartition

final class HumboldtCatalogReaderFactory(required: StructType)
    extends PartitionReaderFactory {
  override def createReader(partition: InputPartition): PartitionReader[InternalRow] =
    new HumboldtCatalogReader(partition.asInstanceOf[DatasetPartition], required)
}

final class HumboldtCatalogReader(p: DatasetPartition, required: StructType)
    extends PartitionReader[InternalRow] {
  private var emitted = false
  private var row: InternalRow = _

  override def next(): Boolean = {
    if (emitted) return false
    row = extract()
    emitted = true
    true
  }

  override def get(): InternalRow = row
  override def close(): Unit = ()

  private def extract(): InternalRow = {
    val conf  = new Configuration()
    val fs    = new Path(p.datasetPath).getFileSystem(conf)
    val files = fs.listStatus(new Path(p.datasetPath))
      .filter(st => st.isFile && st.getPath.getName.endsWith(".parquet"))
      .sortBy(_.getPath.getName)

    val needFooters = required.fieldNames.exists(f =>
      !HumboldtCatalogTable.ListingOnlyColumns.contains(f))

    var rowCount   = 0L
    var columns    = Seq.empty[String]
    if (needFooters) {
      files.foreach { st =>
        val reader = ParquetFileReader.open(HadoopInputFile.fromStatus(st, conf))
        try {
          rowCount += reader.getFooter.getBlocks.asScala.map(_.getRowCount).sum
          if (columns.isEmpty)
            columns = reader.getFooter.getFileMetaData.getSchema.getFields.asScala
              .map(_.getName).toSeq
        } finally reader.close()
      }
    }

    val values: Map[String, Any] = Map(
      "name"        -> UTF8String.fromString(p.datasetName),
      "path"        -> UTF8String.fromString(p.datasetPath),
      "num_files"   -> files.length,
      "size_bytes"  -> files.map(_.getLen).sum,
      "modified_at" -> (if (files.isEmpty) 0L else files.map(_.getModificationTime).max),
      "row_count"   -> rowCount,
      "num_columns" -> columns.size,
      "columns"     -> UTF8String.fromString(columns.mkString(",")),
    )
    InternalRow.fromSeq(required.fieldNames.toSeq.map(values))
  }
}
