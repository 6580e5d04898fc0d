package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer
import TestData._

class NestedAndSharedSpec extends AnyFunSuite {

  test("RowScan unnests a collection field") {
    val inner: RowVec = pairs(1L -> 10L, 2L -> 20L)
    val outer = new VectorSource(
      ArrayBuffer(Array[Any](7, inner)),
      TupleType.of("npid" -> Atom.IntA, "data" -> CollectionType(PairT)))
    val rs = new RowScan(outer, "data")
    assert(rs.outType == PairT)
    assert(asPairs(rs.drain().toSeq) == Seq(1L -> 10L, 2L -> 20L))
  }

  test("RowScan flattens across multiple upstream tuples, including empties") {
    val t = TupleType.of("data" -> CollectionType(PairT))
    val outer = new VectorSource(
      ArrayBuffer(
        Array[Any](pairs(1L -> 1L)),
        Array[Any](pairs()),
        Array[Any](pairs(2L -> 2L, 3L -> 3L))),
      t)
    assert(asPairs(new RowScan(outer, "data").drain().toSeq) ==
      Seq(1L -> 1L, 2L -> 2L, 3L -> 3L))
  }

  test("RowScan rejects non-collection fields at construction") {
    intercept[IllegalArgumentException](new RowScan(src(1L -> 1L), "k"))
  }

  test("MaterializeRowVector collects into one tuple") {
    val m = new MaterializeRowVector(src(1L -> 10L, 2L -> 20L), "data")
    val t = m.drainOne()
    assert(m.outType.fieldNames == Vector("data"))
    assert(asPairs(t(0).asInstanceOf[RowVec].toSeq) == Seq(1L -> 10L, 2L -> 20L))
  }

  test("MaterializeRowVector emits one tuple even on empty input") {
    val t = new MaterializeRowVector(src(), "data").drainOne()
    assert(t(0).asInstanceOf[RowVec].isEmpty)
  }

  test("RowScan(MaterializeRowVector(x)) is identity on the stream") {
    val round = new RowScan(new MaterializeRowVector(src(1L -> 1L, 2L -> 2L), "d"), "d")
    assert(asPairs(round.drain().toSeq) == Seq(1L -> 1L, 2L -> 2L))
  }

  test("NestedMap runs the nested plan once per input tuple") {
    val nm = new NestedMap(src(1L -> 10L, 2L -> 20L), slot => {
      val pl = new ParameterLookup(slot)
      new MapOp(pl, t => Array[Any](t(0).asInstanceOf[Long] * 100), TupleType.of("x" -> Atom.LongA))
    })
    assert(nm.drain().map(_(0)) == Seq(100L, 200L))
  }

  test("NestedMap enforces exactly-one-output nested plans") {
    val nm = new NestedMap(src(1L -> 10L), slot => {
      // nested plan emitting two tuples: PL feeding a cartesian with itself
      val pl1 = new Rename(new ParameterLookup(slot), Seq("a", "b"))
      val two = new VectorSource(pairs(1L -> 1L, 2L -> 2L), PairT)
      new CartesianProduct(pl1, two)
    })
    intercept[IllegalArgumentException](nm.drain())
  }

  test("NestedMap with nested collections (the Fig 3 motif)") {
    // outer tuples carry partitions; nested plan sums each partition
    val outerT = TupleType.of("data" -> CollectionType(PairT))
    val outer = new VectorSource(
      ArrayBuffer(Array[Any](pairs(1L -> 1L, 2L -> 2L)), Array[Any](pairs(10L -> 10L))),
      outerT)
    val nm = new NestedMap(outer, slot => {
      val scan = new RowScan(new ParameterLookup(slot), "data")
      new Reduce(scan, (a, b) =>
        Array[Any](a(0).asInstanceOf[Long] + b(0).asInstanceOf[Long],
                   a(1).asInstanceOf[Long] + b(1).asInstanceOf[Long]))
    })
    assert(asPairs(nm.drain().toSeq) == Seq(3L -> 3L, 10L -> 10L))
  }

  test("Shared materializes once per invocation and replays to all consumers") {
    var opens = 0
    val counted = new SubOp {
      override val outType: TupleType = PairT
      private var i = 0
      override def open(): Unit = { opens += 1; i = 0 }
      override def next(): Array[Any] =
        if (i >= 2) null else { i += 1; Array[Any](i.toLong, i.toLong) }
      override def close(): Unit = ()
    }
    val sh = new Shared(counted)
    val s1 = sh.scan
    val s2 = sh.scan
    assert(s1.drain().size == 2)
    assert(s2.drain().size == 2)
    assert(opens == 1) // one invocation: both consumers, one materialization
    // second invocation: both consumers re-open → exactly one more run
    assert(s1.drain().size == 2)
    assert(s2.drain().size == 2)
    assert(opens == 2)
  }

  test("Shared inside a NestedMap recomputes per nested invocation") {
    val outerT = TupleType.of("data" -> CollectionType(PairT))
    val outer = new VectorSource(
      ArrayBuffer(Array[Any](pairs(1L -> 1L)), Array[Any](pairs(5L -> 5L))),
      outerT)
    val nm = new NestedMap(outer, slot => {
      val sh = new Shared(new RowScan(new ParameterLookup(slot), "data"))
      val a = new Rename(sh.scan, Seq("ak", "av"))
      val b = new Rename(sh.scan, Seq("bk", "bv"))
      new Zip(Seq(a, b))
    })
    val rows = nm.drain()
    assert(rows.map(_.toSeq) == Seq(Seq(1L, 1L, 1L, 1L), Seq(5L, 5L, 5L, 5L)))
  }

  test("Shared refuses late consumers") {
    val sh = new Shared(src(1L -> 1L))
    val s1 = sh.scan
    s1.drain()
    intercept[IllegalArgumentException](sh.scan)
  }
}
