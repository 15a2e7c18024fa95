package repro.sparkds

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.util.GenericArrayData
import org.apache.spark.sql.catalyst.expressions.GenericInternalRow
import org.apache.spark.sql.connector.catalog._
import org.apache.spark.sql.connector.expressions.Transform
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.sources._
import org.apache.spark.sql.types._
import org.apache.spark.sql.util.CaseInsensitiveStringMap
import org.apache.spark.unsafe.types.UTF8String
import repro.core._
import repro.encoding.AtomicType
import repro.lsm._
import repro.lsm.layout.AmaxLayout
import scala.collection.mutable

/** DataSourceV2 over an LSM dataset directory (the repro hint's "custom
  * columnar V2 DataSource using Dremel-style nested columnar encoding over
  * LSM-organized Parquet-like files").
  *
  * - `inferSchema` maps the dataset's inferred schema to Spark types; union
  *   nodes become structs with one field per alternative (tagged by kind).
  * - Column pruning maps the required struct back to leaf columns, so AMAX
  *   reads only the needed megapages.
  * - Filter pushdown turns scalar range predicates into AMAX zone-map
  *   predicates; all filters are also left as residuals for Catalyst, so
  *   pruning is purely an I/O optimization.
  *
  * Usage: `spark.read.format("repro.sparkds.LsmColumnarSource").load(dir)`.
  */
class LsmColumnarSource extends TableProvider with DataSourceRegister {
  override def shortName(): String = "lsmcol"

  override def inferSchema(options: CaseInsensitiveStringMap): StructType = {
    val ds = LsmColumnarSource.open(options.get("path"))
    SparkSchema.toStructType(ds)
  }

  override def getTable(schema: StructType, partitioning: Array[Transform],
                        properties: java.util.Map[String, String]): Table =
    new LsmTable(properties.get("path"), schema)

  override def supportsExternalMetadata(): Boolean = true
}

object LsmColumnarSource {
  private val cache = mutable.Map.empty[String, LsmDataset]
  val io = new IoStats

  /** JVM-local dataset cache: partitions reference datasets by path. */
  def open(path: String): LsmDataset = synchronized {
    cache.getOrElseUpdate(path,
      LsmDataset.openReadOnly(new java.io.File(path), new BufferCache(4096, io)))
  }
  def evict(path: String): Unit = synchronized { cache.remove(path): Unit }
}

final class LsmTable(path: String, tschema: StructType) extends Table with SupportsRead {
  override def name(): String = s"lsmcol:$path"
  override def schema(): StructType = tschema
  override def capabilities(): java.util.Set[TableCapability] =
    java.util.EnumSet.of(TableCapability.BATCH_READ)
  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder =
    new LsmScanBuilder(path, tschema)
}

final class LsmScanBuilder(path: String, fullSchema: StructType)
    extends ScanBuilder with SupportsPushDownRequiredColumns with SupportsPushDownFilters {
  private var required: StructType = fullSchema
  private var accepted: Array[Filter] = Array.empty

  override def pruneColumns(requiredSchema: StructType): Unit = required = requiredSchema

  override def pushFilters(filters: Array[Filter]): Array[Filter] = {
    // Accept scalar comparisons for zone-map skipping; everything remains a
    // residual (the zone map may only skip, never decide).
    accepted = filters.filter {
      case EqualTo(_, _) | GreaterThan(_, _) | GreaterThanOrEqual(_, _)
           | LessThan(_, _) | LessThanOrEqual(_, _) => true
      case _ => false
    }
    filters
  }
  override def pushedFilters(): Array[Filter] = accepted

  override def build(): Scan = new LsmScan(path, required, accepted)
}

final class LsmScan(path: String, required: StructType, filters: Array[Filter])
    extends Scan with Batch {
  override def readSchema(): StructType = required
  override def toBatch: Batch = this
  override def planInputPartitions(): Array[InputPartition] =
    Array(LsmInputPartition(path, required.json, filters))
  override def createReaderFactory(): PartitionReaderFactory = new LsmReaderFactory
}

final case class LsmInputPartition(path: String, requiredJson: String,
                                   filters: Array[Filter]) extends InputPartition

final class LsmReaderFactory extends PartitionReaderFactory {
  override def createReader(partition: InputPartition): PartitionReader[InternalRow] = {
    val p = partition.asInstanceOf[LsmInputPartition]
    val required = DataType.fromJson(p.requiredJson).asInstanceOf[StructType]
    new LsmPartitionReader(LsmColumnarSource.open(p.path), required, p.filters)
  }
}

final class LsmPartitionReader(ds: LsmDataset, required: StructType, filters: Array[Filter])
    extends PartitionReader[InternalRow] {
  private val projection = SparkSchema.projectionFor(ds, required)
  private val zone = SparkSchema.zoneFromFilters(ds, filters)
  private val iter = ds.scan(projection, zone).filterNot(_.pruned)
  private val convert = SparkSchema.rowConverter(ds, required)
  private var current: InternalRow = _

  override def next(): Boolean =
    if (iter.hasNext) { current = convert(iter.next()); true } else false
  override def get(): InternalRow = current
  override def close(): Unit = ()
}

/** Schema / value mapping between the inferred document schema and Spark. */
object SparkSchema {

  private def sparkType(node: SchemaNode): DataType = node match {
    case at: AtomicNode => at.tpe match {
      case AtomicType.TLong   => LongType
      case AtomicType.TDouble => DoubleType
      case AtomicType.TString => StringType
      case AtomicType.TBool   => BooleanType
      case AtomicType.TNull   => StringType
    }
    case on: ObjectNode =>
      StructType(on.fields.toSeq.map { case (k, c) => StructField(k, sparkType(c), nullable = true) })
    case an: ArrayNode =>
      ArrayType(if (an.item == null) StringType else sparkType(an.item), containsNull = true)
    case un: UnionNode =>
      // Union alternatives become struct fields tagged by their kind; at most
      // one is non-null per row (§3.2.2 mapped onto Spark's typed world).
      StructType(un.alternatives.toSeq.map { case (k, c) => StructField(k, sparkType(c), nullable = true) })
  }

  def toStructType(ds: LsmDataset): StructType =
    StructType(StructField(ds.pkField, LongType, nullable = false) +:
      ds.schema.root.fields.toSeq.map { case (k, c) => StructField(k, sparkType(c), nullable = true) })

  /** Leaf columns needed to populate `required` (nested pruning included). */
  def projectionFor(ds: LsmDataset, required: StructType): Array[Int] = {
    val ids = mutable.SortedSet.empty[Int]
    def collect(node: SchemaNode, t: DataType): Unit = (node, t) match {
      case (at: AtomicNode, _) => ids += at.columnId
      case (on: ObjectNode, st: StructType) =>
        st.fields.foreach(f => on.fields.get(f.name).foreach(collect(_, f.dataType)))
      case (un: UnionNode, st: StructType) =>
        st.fields.foreach(f => un.alternatives.get(f.name).foreach(collect(_, f.dataType)))
      case (an: ArrayNode, at: ArrayType) =>
        if (an.item != null) collect(an.item, at.elementType)
      case (n, _) => // type mismatch (shouldn't happen): take the whole subtree
        ds.schema.columns.foreach(m => ids += m.columnId)
    }
    required.fields.foreach { f =>
      if (f.name != ds.pkField)
        ds.schema.root.fields.get(f.name).foreach(collect(_, f.dataType))
    }
    ids.toArray
  }

  def zoneFromFilters(ds: LsmDataset, filters: Array[Filter]): AmaxLayout.ZonePredicate = {
    if (ds.layout != LayoutKind.Amax || filters == null || filters.isEmpty) return null
    def jv(v: Any): JValue = v match {
      case l: Long => JLong(l); case i: Int => JLong(i.toLong)
      case d: Double => JDouble(d); case f: Float => JDouble(f.toDouble)
      case s: String => JString(s)
      case s: UTF8String => JString(s.toString)
      case _ => JNull
    }
    def scalarCol(name: String): Option[ColumnMeta] =
      ds.schema.root.fields.get(name) match {
        case Some(at: AtomicNode) => Some(ds.schema.column(at.columnId))
        case _ => None
      }
    val ranges = filters.toSeq.flatMap {
      case EqualTo(a, v)            => scalarCol(a).map(m => (m, jv(v), jv(v)))
      case GreaterThan(a, v)        => scalarCol(a).map(m => (m, jv(v), JNull))
      case GreaterThanOrEqual(a, v) => scalarCol(a).map(m => (m, jv(v), JNull))
      case LessThan(a, v)           => scalarCol(a).map(m => (m, JNull, jv(v)))
      case LessThanOrEqual(a, v)    => scalarCol(a).map(m => (m, JNull, jv(v)))
      case _ => None
    }.filter { case (m, lo, hi) =>
      def ok(j: JValue) = j == JNull ||
        (m.tpe == AtomicType.TLong && j.isInstanceOf[JLong]) ||
        (m.tpe == AtomicType.TDouble && j.isInstanceOf[JDouble]) ||
        (m.tpe == AtomicType.TString && j.isInstanceOf[JString])
      ok(lo) && ok(hi)
    }
    if (ranges.isEmpty) null else AmaxLayout.ZonePredicate(ranges)
  }

  /** Tuple → InternalRow converter driven by (schema node, spark type). */
  def rowConverter(ds: LsmDataset, required: StructType): ScanTuple => InternalRow = {
    def conv(node: SchemaNode, t: DataType, v: JValue): Any = {
      if (v == null || v == JNull) return null
      (node, t) match {
        case (_: AtomicNode, LongType)    => v match { case JLong(l) => l; case _ => null }
        case (_: AtomicNode, DoubleType)  => v match { case JDouble(d) => d; case _ => null }
        case (_: AtomicNode, StringType)  => v match { case JString(s) => UTF8String.fromString(s); case _ => null }
        case (_: AtomicNode, BooleanType) => v match { case JBool(b) => b; case _ => null }
        case (on: ObjectNode, st: StructType) => v match {
          case o: JObject =>
            new GenericInternalRow(st.fields.map { f =>
              on.fields.get(f.name) match {
                case Some(child) => conv(child, f.dataType, o.get(f.name).getOrElse(JNull))
                case None        => null
              }
            }.asInstanceOf[Array[Any]])
          case _ => null
        }
        case (un: UnionNode, st: StructType) =>
          val kind = Kind.of(v)
          new GenericInternalRow(st.fields.map { f =>
            if (f.name == kind) un.alternatives.get(kind).map(conv(_, f.dataType, v)).orNull
            else null
          }.asInstanceOf[Array[Any]])
        case (an: ArrayNode, at: ArrayType) => v match {
          case JArray(items) if an.item != null =>
            new GenericArrayData(items.map(conv(an.item, at.elementType, _)).toArray)
          case JArray(_) => new GenericArrayData(Array.empty[Any])
          case _ => null
        }
        case _ => null
      }
    }
    (tuple: ScanTuple) => {
      val rec = tuple.record()
      new GenericInternalRow(required.fields.map { f =>
        if (f.name == ds.pkField) tuple.key
        else ds.schema.root.fields.get(f.name) match {
          case Some(child) => conv(child, f.dataType, rec.get(f.name).getOrElse(JNull))
          case None        => null
        }
      }.asInstanceOf[Array[Any]])
    }
  }
}
