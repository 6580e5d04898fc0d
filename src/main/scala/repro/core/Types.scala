package repro.core

/** Recursive type system for sub-operator tuples (paper §3.2).
  *
  * `tuple := ⟨item, ..., item⟩`; `item := atom | collection of tuples`.
  * A [[TupleType]] maps static field names to [[ItemType]]s; a
  * [[CollectionType]] generalizes any physical format of nested tuples
  * (our single runtime format is the RowVector: `RowVec`).
  * Field-name resolution happens once at plan-construction time, so the
  * per-tuple hot path works on positional `Array[Any]` access only.
  */
sealed trait ItemType {
  def render: String
}

/** An undividable value domain (long, double, string, ...). Atoms compare
  * by name; the Spark port uses Catalyst type names as atom names.
  */
final case class Atom(name: String) extends ItemType {
  override def render: String = name
}

object Atom {
  val LongA: Atom    = Atom("long")
  val IntA: Atom     = Atom("int")
  val DoubleA: Atom  = Atom("double")
  val StringA: Atom  = Atom("string")
  val BoolA: Atom    = Atom("bool")
  /** Dates are carried as epoch-day ints inside sub-operator tuples. */
  val DateA: Atom    = Atom("date")
}

/** The generalization of any physical data format of tuples of `elem` type;
  * at runtime always a RowVector (`RowVec`).
  */
final case class CollectionType(elem: TupleType) extends ItemType {
  override def render: String = s"RowVector<${elem.render}>"
}

/** A statically known mapping from field names to item types. */
final case class TupleType(fields: Vector[(String, ItemType)]) {
  require(
    fields.map(_._1).distinct.size == fields.size,
    s"duplicate field names in $render"
  )

  def fieldNames: Vector[String] = fields.map(_._1)
  def arity: Int = fields.size

  /** Index of `name`, failing loudly at plan-construction time. */
  def indexOf(name: String): Int = {
    val i = fields.indexWhere(_._1 == name)
    require(i >= 0, s"no field '$name' in $render")
    i
  }

  def typeOf(name: String): ItemType = fields(indexOf(name))._2

  /** Concatenation; duplicate names are a plan-construction error
    * (the distinct-field-name rule of Zip/CartesianProduct/BuildProbe).
    */
  def ++(o: TupleType): TupleType = TupleType(fields ++ o.fields)

  def project(names: Seq[String]): TupleType =
    TupleType(names.toVector.map(n => fields(indexOf(n))))

  /** Same item types under new names (positional). */
  def renamed(newNames: Seq[String]): TupleType = {
    require(newNames.size == arity, s"rename arity mismatch for $render")
    TupleType(newNames.toVector.zip(fields.map(_._2)))
  }

  def without(names: Set[String]): TupleType =
    TupleType(fields.filterNot(f => names.contains(f._1)))

  def render: String =
    fields.map { case (n, t) => s"$n: ${t.render}" }.mkString("⟨", ", ", "⟩")
}

object TupleType {
  def of(fs: (String, ItemType)*): TupleType = TupleType(fs.toVector)
}

/** Rough wire-size estimator used for network byte accounting in the
  * simulated cluster (the paper's workloads are 16-byte ⟨8B,8B⟩ tuples).
  */
object Bytes {
  def ofAtom(a: Atom): Int = a.name match {
    case "long" | "double" => 8
    case "int" | "date"    => 4
    case "bool"            => 1
    case _                 => 16 // strings and unknown atoms: flat estimate
  }

  /** Static per-tuple estimate; nested collections are estimated at zero
    * here and accounted by their own transfers.
    */
  def perTuple(t: TupleType): Int =
    t.fields.map {
      case (_, a: Atom)          => ofAtom(a)
      case (_, _: CollectionType) => 0
    }.sum
}
