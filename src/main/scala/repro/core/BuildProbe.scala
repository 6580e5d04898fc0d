package repro.core

import scala.collection.mutable

/** Join variants. The paper's extensibility claim (§5.1.1) is that new join
  * types only require modifying this one 103-SLOC operator — we implement
  * inner, semi, anti, and (probe-preserving) outer to substantiate it.
  * Semi/anti/outer preserve the probe side.
  */
sealed trait JoinKind
object JoinKind {
  case object Inner extends JoinKind
  case object Semi  extends JoinKind
  case object Anti  extends JoinKind
  case object Outer extends JoinKind
}

/** BuildProbe (paper §3.3.2): hash join of the build (left) and probe (right)
  * upstreams on a set of identically named join attributes. Inner/outer
  * output = join attributes + remaining build fields + remaining probe fields
  * (names must be distinct); semi/anti output = the unmodified probe tuple.
  *
  * SQL null semantics: a null in any join attribute never matches (and such
  * probe tuples are kept by Anti/Outer), so results agree with DuckDB.
  */
final class BuildProbe(
    build: SubOp,
    probe: SubOp,
    joinAttrs: Seq[String],
    kind: JoinKind = JoinKind.Inner,
) extends SubOp {
  require(joinAttrs.nonEmpty, "BuildProbe needs at least one join attribute")

  private val bType = build.outType
  private val pType = probe.outType
  private val bKeyIdx  = joinAttrs.map(bType.indexOf).toArray
  private val pKeyIdx  = joinAttrs.map(pType.indexOf).toArray
  private val bRestIdx = bType.fieldNames.zipWithIndex
    .collect { case (n, i) if !joinAttrs.contains(n) => i }.toArray
  private val pRestIdx = pType.fieldNames.zipWithIndex
    .collect { case (n, i) if !joinAttrs.contains(n) => i }.toArray

  override val outType: TupleType = kind match {
    case JoinKind.Semi | JoinKind.Anti => pType
    case _ =>
      bType.project(joinAttrs) ++
        bType.without(joinAttrs.toSet) ++
        pType.without(joinAttrs.toSet)
  }

  private var table: mutable.HashMap[Any, mutable.ArrayBuffer[Array[Any]]] = _
  private var pCur: Array[Any] = _
  private var matches: mutable.ArrayBuffer[Array[Any]] = _
  private var mIdx = 0

  private def keyOf(t: Array[Any], idx: Array[Int]): Any = {
    var i = 0
    while (i < idx.length) { if (t(idx(i)) == null) return null; i += 1 }
    if (idx.length == 1) t(idx(0)) else idx.toSeq.map(t(_))
  }

  override def open(): Unit = {
    table = mutable.HashMap.empty
    build.open()
    var t = build.next()
    while (t != null) {
      val k = keyOf(t, bKeyIdx)
      if (k != null) table.getOrElseUpdate(k, mutable.ArrayBuffer.empty) += t
      t = build.next()
    }
    build.close()
    probe.open()
    pCur = null
    matches = null
    mIdx = 0
  }

  private def emit(bt: Array[Any], pt: Array[Any]): Array[Any] = {
    val out = new Array[Any](joinAttrs.size + bRestIdx.length + pRestIdx.length)
    var o = 0
    var i = 0
    while (i < bKeyIdx.length)  { out(o) = if (bt != null) bt(bKeyIdx(i)) else pt(pKeyIdx(i)); o += 1; i += 1 }
    i = 0
    while (i < bRestIdx.length) { out(o) = if (bt != null) bt(bRestIdx(i)) else null; o += 1; i += 1 }
    i = 0
    while (i < pRestIdx.length) { out(o) = pt(pRestIdx(i)); o += 1; i += 1 }
    out
  }

  override def next(): Array[Any] = {
    while (true) {
      if (matches != null && mIdx < matches.size) {
        val bt = matches(mIdx); mIdx += 1
        return emit(bt, pCur)
      }
      matches = null
      pCur = probe.next()
      if (pCur == null) return null
      val k = keyOf(pCur, pKeyIdx)
      val hit = if (k == null) None else table.get(k)
      kind match {
        case JoinKind.Inner =>
          hit.foreach { ms => matches = ms; mIdx = 0 }
        case JoinKind.Semi =>
          if (hit.isDefined) return pCur
        case JoinKind.Anti =>
          if (hit.isEmpty) return pCur
        case JoinKind.Outer =>
          hit match {
            case Some(ms) => matches = ms; mIdx = 0
            case None     => return emit(null, pCur)
          }
      }
    }
    null // unreachable
  }

  override def close(): Unit = {
    probe.close()
    table = null
    matches = null
  }
}
