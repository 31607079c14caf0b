package repro.fastframe

/** Dictionary-encoded categorical column: `codes(row)` indexes into `dict`.
  * FastFrame builds block bitmaps only over categorical columns (paper §4).
  */
final case class CatColumn(name: String, codes: Array[Int], dict: Array[String]) {
  require(codes.forall(c => c >= 0 && c < dict.length), s"column $name has out-of-dict codes")

  def cardinality: Int = dict.length

  def codeOf(value: String): Int = {
    val i = dict.indexOf(value)
    require(i >= 0, s"value '$value' not in dictionary of column $name")
    i
  }
}

/** Plain numeric column. The catalog range for [a, b] comes from its
  * min/max, inferred at load time (paper §2.2.1, "Known Range Bounds").
  */
final case class NumColumn(name: String, values: Array[Double]) {
  def min: Double = if (values.isEmpty) 0.0 else values.min
  def max: Double = if (values.isEmpty) 0.0 else values.max
}

/** In-memory column store: the base relation FastFrame operates over.
  * All columns must have identical length.
  */
final class ColumnStore(
    val cats: Map[String, CatColumn],
    val nums: Map[String, NumColumn]) {

  val numRows: Int = {
    val lens = cats.values.map(_.codes.length) ++ nums.values.map(_.values.length)
    require(lens.nonEmpty, "a ColumnStore needs at least one column")
    require(lens.toSet.size == 1, s"ragged columns: ${lens.toSet}")
    lens.head
  }

  def cat(name: String): CatColumn =
    cats.getOrElse(name, throw new NoSuchElementException(s"no categorical column '$name'"))

  def num(name: String): NumColumn =
    nums.getOrElse(name, throw new NoSuchElementException(s"no numeric column '$name'"))

  /** A copy of this store with rows re-ordered by `perm` (row i of the
    * result is row perm(i) of this store).
    */
  def permuted(perm: Array[Int]): ColumnStore = {
    require(perm.length == numRows, "permutation length must equal numRows")
    new ColumnStore(
      cats.map { case (n, c) => n -> c.copy(codes = perm.map(c.codes)) },
      nums.map { case (n, c) => n -> c.copy(values = perm.map(c.values)) })
  }
}
