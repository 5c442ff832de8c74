package repro.mpc

/** A relation protected by an MPC engine.
  *
  * Every cell is an engine value ([[MpcVal]]) holding a fixed-point encoded
  * data value. `validity`, when present, is a column of raw 0/1 flags: rows
  * whose flag is 0 have been obliviously filtered out but are still carried
  * (size-hiding, order-preserving filtering — see `Oblivious.filter`).
  *
  * The row count of a shared relation is public (standard MPC treatment of
  * input lengths, paper §3.2); the validity pattern is not.
  */
final case class SharedRelation(
    schema: Vector[String],
    rows: Vector[Vector[MpcVal]],
    validity: Option[Vector[MpcVal]] = None,
) {
  require(rows.forall(_.length == schema.length),
    s"row arity mismatch against schema $schema")
  require(validity.forall(_.length == rows.length), "validity length mismatch")

  def size: Int = rows.length
  def width: Int = schema.length

  def colIdx(name: String): Int = {
    val i = schema.indexOf(name)
    require(i >= 0, s"no column '$name' in $schema")
    i
  }

  def colIdxs(names: Seq[String]): Vector[Int] = names.map(colIdx).toVector
}
