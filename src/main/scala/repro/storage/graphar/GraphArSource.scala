package repro.storage.graphar

import java.io.File
import java.util.{Map => JMap}
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.connector.catalog.{SupportsRead, Table, TableCapability, TableProvider}
import org.apache.spark.sql.connector.expressions.Transform
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.sources._
import org.apache.spark.sql.types._
import org.apache.spark.sql.util.CaseInsensitiveStringMap
import org.apache.spark.unsafe.types.UTF8String
import scala.jdk.CollectionConverters._
import GarFormat._

/** DataSource V2 connector for GraphAr-lite tables.
  *
  * This is the extension point mandated for "a new file format or index":
  * `spark.read.format("graphar").load(dir)` (registered via
  * META-INF/services) plans one Spark input partition per chunk, prunes
  * chunks with the zone-map index when filters on the sort column are
  * pushed down, and decodes only the requested columns. GraphAr's paper
  * claim — "retrieve only the relevant data chunks, potentially in
  * parallel" — maps exactly onto these two pushdowns.
  */
class GraphArSource extends TableProvider with DataSourceRegister {
  override def shortName(): String = "graphar"
  override def supportsExternalMetadata(): Boolean = false

  private def dir(options: CaseInsensitiveStringMap): String = {
    val p = options.get("path")
    require(p != null, "graphar reader requires a path")
    p
  }

  override def inferSchema(options: CaseInsensitiveStringMap): StructType =
    GraphArTable.schemaOf(readMeta(dir(options)))

  override def getTable(schema: StructType, partitioning: Array[Transform],
                        properties: JMap[String, String]): Table =
    new GraphArTable(properties.get("path"))
}

object GraphArTable {
  def schemaOf(meta: TableMeta): StructType =
    StructType(meta.cols.map { case (name, t) =>
      StructField(name, t match {
        case "long" => LongType
        case "double" => DoubleType
        case _ => StringType
      }, nullable = true)
    })
}

class GraphArTable(dir: String) extends Table with SupportsRead {
  private val meta = readMeta(dir)
  override def name(): String = s"graphar:$dir"
  override def schema(): StructType = GraphArTable.schemaOf(meta)
  override def capabilities(): java.util.Set[TableCapability] =
    java.util.EnumSet.of(TableCapability.BATCH_READ)
  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder =
    new GraphArScanBuilder(dir, meta)
}

class GraphArScanBuilder(dir: String, meta: TableMeta)
    extends ScanBuilder with SupportsPushDownFilters with SupportsPushDownRequiredColumns {

  private var required: StructType = GraphArTable.schemaOf(meta)
  private var pushed: Array[Filter] = Array.empty

  /** Accepts comparisons on the sort column; everything else stays with Spark. */
  override def pushFilters(filters: Array[Filter]): Array[Filter] = {
    val (ours, theirs) = filters.partition {
      case EqualTo(a, _: java.lang.Long) => a == meta.sortCol
      case GreaterThan(a, _: java.lang.Long) => a == meta.sortCol
      case GreaterThanOrEqual(a, _: java.lang.Long) => a == meta.sortCol
      case LessThan(a, _: java.lang.Long) => a == meta.sortCol
      case LessThanOrEqual(a, _: java.lang.Long) => a == meta.sortCol
      case _ => false
    }
    pushed = ours
    theirs
  }
  override def pushedFilters(): Array[Filter] = pushed

  override def pruneColumns(requiredSchema: StructType): Unit = { required = requiredSchema }

  override def build(): Scan = new GraphArScan(dir, meta, required, pushed)
}

/** (op, bound) pairs — a serializable rendering of the pushed filters. */
private[graphar] case class KeyPred(op: String, bound: Long) extends Serializable {
  def admitsChunk(min: Long, max: Long): Boolean = op match {
    case "=" => bound >= min && bound <= max
    case ">" => max > bound
    case ">=" => max >= bound
    case "<" => min < bound
    case "<=" => min <= bound
  }
  def admitsRow(k: Long): Boolean = op match {
    case "=" => k == bound
    case ">" => k > bound
    case ">=" => k >= bound
    case "<" => k < bound
    case "<=" => k <= bound
  }
}

class GraphArScan(dir: String, meta: TableMeta, required: StructType, pushed: Array[Filter])
    extends Scan with Batch {

  private val preds: Array[KeyPred] = pushed.map {
    case EqualTo(_, v: java.lang.Long) => KeyPred("=", v)
    case GreaterThan(_, v: java.lang.Long) => KeyPred(">", v)
    case GreaterThanOrEqual(_, v: java.lang.Long) => KeyPred(">=", v)
    case LessThan(_, v: java.lang.Long) => KeyPred("<", v)
    case LessThanOrEqual(_, v: java.lang.Long) => KeyPred("<=", v)
    case other => throw new IllegalStateException(s"unexpected pushed filter $other")
  }

  override def readSchema(): StructType = required
  override def toBatch: Batch = this
  override def description(): String =
    s"GraphArScan(${meta.chunks.length} chunks, pushed=${pushed.mkString(",")})"

  override def planInputPartitions(): Array[InputPartition] =
    meta.chunks
      .filter(c => preds.forall(_.admitsChunk(c.minKey, c.maxKey))) // zone-map pruning
      .map(c => GarInputPartition(new File(dir, c.file).getPath): InputPartition)
      .toArray

  override def createReaderFactory(): PartitionReaderFactory =
    new GarReaderFactory(required.fields.map(f => (f.name, f.dataType.typeName)),
      meta.sortCol, preds)
}

case class GarInputPartition(file: String) extends InputPartition

class GarReaderFactory(cols: Array[(String, String)], sortCol: String,
                       preds: Array[KeyPred]) extends PartitionReaderFactory {
  override def createReader(partition: InputPartition): PartitionReader[InternalRow] = {
    val file = partition.asInstanceOf[GarInputPartition].file
    new GarPartitionReader(file, cols, sortCol, preds)
  }
}

class GarPartitionReader(file: String, cols: Array[(String, String)], sortCol: String,
                         preds: Array[KeyPred]) extends PartitionReader[InternalRow] {
  // Decode required columns, plus the sort column when row filters apply.
  private val wanted = cols.map(_._1).toSet ++ (if (preds.nonEmpty) Set(sortCol) else Set.empty)
  private val chunk = readChunk(file, wanted)
  private val outCols: Array[GarCol] = cols.map { case (n, _) => chunk.col(n) }
  private val keyCol: Array[Long] =
    if (preds.nonEmpty) chunk.col(sortCol).asInstanceOf[GarLongCol].a else null
  private var row = -1

  override def next(): Boolean = {
    row += 1
    while (row < chunk.nRows && keyCol != null && !preds.forall(_.admitsRow(keyCol(row)))) row += 1
    row < chunk.nRows
  }

  override def get(): InternalRow = {
    val values = new Array[Any](outCols.length)
    var i = 0
    while (i < outCols.length) {
      values(i) = outCols(i) match {
        case GarLongCol(a) => if (a(row) == Long.MinValue) null else a(row)
        case GarDoubleCol(a) => if (a(row).isNaN) null else a(row)
        case GarStringCol(a) => if (a(row) == null) null else UTF8String.fromString(a(row))
      }
      i += 1
    }
    InternalRow.fromSeq(values.toIndexedSeq)
  }

  override def close(): Unit = {}
}
