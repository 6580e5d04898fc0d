package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TypesSpec extends AnyFunSuite {
  private val t = TupleType.of("k" -> Atom.LongA, "v" -> Atom.DoubleA)

  test("fieldNames and arity") {
    assert(t.fieldNames == Vector("k", "v"))
    assert(t.arity == 2)
  }

  test("indexOf finds fields") {
    assert(t.indexOf("k") == 0)
    assert(t.indexOf("v") == 1)
  }

  test("indexOf fails loudly for missing field") {
    val e = intercept[IllegalArgumentException](t.indexOf("nope"))
    assert(e.getMessage.contains("nope"))
  }

  test("typeOf returns item types") {
    assert(t.typeOf("k") == Atom.LongA)
    assert(t.typeOf("v") == Atom.DoubleA)
  }

  test("duplicate field names rejected at construction") {
    intercept[IllegalArgumentException] {
      TupleType.of("a" -> Atom.IntA, "a" -> Atom.LongA)
    }
  }

  test("concatenation preserves order") {
    val u = TupleType.of("a" -> Atom.IntA)
    assert((t ++ u).fieldNames == Vector("k", "v", "a"))
  }

  test("concatenation with duplicate names rejected") {
    intercept[IllegalArgumentException](t ++ TupleType.of("k" -> Atom.IntA))
  }

  test("project keeps requested fields in requested order") {
    val p = t.project(Seq("v", "k"))
    assert(p.fieldNames == Vector("v", "k"))
    assert(p.typeOf("v") == Atom.DoubleA)
  }

  test("renamed keeps item types positionally") {
    val r = t.renamed(Seq("x", "y"))
    assert(r.fieldNames == Vector("x", "y"))
    assert(r.typeOf("x") == Atom.LongA)
  }

  test("renamed arity mismatch rejected") {
    intercept[IllegalArgumentException](t.renamed(Seq("only")))
  }

  test("without drops fields") {
    assert(t.without(Set("k")).fieldNames == Vector("v"))
  }

  test("collection types render and nest") {
    val c = CollectionType(t)
    assert(c.render.contains("RowVector"))
    val nested = TupleType.of("data" -> c)
    assert(nested.typeOf("data") == c)
  }

  test("byte estimator: paper's 16-byte pair workload") {
    assert(Bytes.perTuple(TupleType.of("k" -> Atom.LongA, "v" -> Atom.LongA)) == 16)
    assert(Bytes.perTuple(TupleType.of("c" -> Atom.LongA)) == 8)
  }

  test("byte estimator: nested collections counted by their own transfers") {
    val nested = TupleType.of("npid" -> Atom.IntA, "data" -> CollectionType(t))
    assert(Bytes.perTuple(nested) == 4)
  }
}
