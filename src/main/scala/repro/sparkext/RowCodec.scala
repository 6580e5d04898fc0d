package repro.sparkext

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.GenericInternalRow
import org.apache.spark.sql.types._

import repro.core._

/** Converts between Catalyst [[InternalRow]]s and sub-operator tuples
  * (`Array[Any]` of Catalyst-native values: Long, Int, Double, UTF8String,
  * date-as-int, ...). Callers must hand in *copied* rows (shuffle iterators
  * reuse UnsafeRow buffers).
  */
object RowCodec {

  /** Atom name for a Catalyst type (atoms compare by name, so the Spark port
    * and the MPI port can share operator implementations).
    */
  def atomOf(dt: DataType): Atom = dt match {
    case LongType    => Atom.LongA
    case IntegerType => Atom.IntA
    case DoubleType  => Atom.DoubleA
    case StringType  => Atom.StringA
    case BooleanType => Atom.BoolA
    case DateType    => Atom.DateA
    case other       => Atom(other.simpleString)
  }

  def tupleTypeOf(schema: StructType, names: Seq[String]): TupleType =
    TupleType(names.toVector.zip(schema.fields.map(f => atomOf(f.dataType): ItemType).toVector))

  /** Extract a row into a fresh positional tuple. */
  def toTuple(row: InternalRow, types: Array[DataType]): Array[Any] = {
    val out = new Array[Any](types.length)
    var i = 0
    while (i < types.length) {
      out(i) = if (row.isNullAt(i)) null else row.get(i, types(i))
      i += 1
    }
    out
  }

  /** Wrap tuple values back into an InternalRow (Catalyst-native values). */
  def toRow(tuple: Array[Any], from: Int, len: Int): InternalRow = {
    val vals = new Array[Any](len)
    System.arraycopy(tuple, from, vals, 0, len)
    new GenericInternalRow(vals)
  }

  /** Adapt a sub-operator to a Scala iterator (open on first hasNext). */
  def iterate(op: SubOp): Iterator[Array[Any]] = new Iterator[Array[Any]] {
    private var opened = false
    private var nextTuple: Array[Any] = _
    private var done = false
    private def advance(): Unit = {
      if (!opened) { op.open(); opened = true }
      nextTuple = op.next()
      if (nextTuple == null) { done = true; op.close() }
    }
    override def hasNext: Boolean = {
      if (!done && nextTuple == null) advance()
      !done
    }
    override def next(): Array[Any] = {
      if (!hasNext) throw new NoSuchElementException
      val t = nextTuple
      nextTuple = null
      t
    }
  }
}
