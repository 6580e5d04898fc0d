package repro

package object core {
  /** Runtime representation of a RowVector collection: any indexed sequence
    * of positional tuples (ArrayBuffer, zero-copy RowSlice, ...).
    */
  type RowVec = scala.collection.IndexedSeq[Array[Any]]
}
