package repro.text

import repro.lake.LakeColumn

/** Column-to-text transformation (Section 3.1 of the paper).
  *
  * Renders a [[LakeColumn]] to the text sequence a given [[TextOption]]
  * prescribes. When the resulting sequence would exceed `maxTokens`, cells
  * are selected by descending corpus frequency (the number of target columns
  * containing the cell value), exactly as Section 3.2 describes; without a
  * frequency map, cells are kept in column order.
  *
  * @param option     which Table-1 pattern to render
  * @param maxTokens  input-length limit of the (simulated) PLM
  * @param frequency  corpus frequency of cell values, for cell selection
  *                   under the length limit; empty map = no reordering
  */
object Contextualizer {
  /** A column's rendered text, one entry per Table-1 field. */
  final case class Rendered(
      title: Option[String],
      colname: Option[String],
      stat: Option[String],
      context: Option[String],
      cells: Seq[String])
}

final class Contextualizer(
    val option: TextOption,
    val maxTokens: Int = 256,
    val frequency: scala.collection.Map[String, Long] = Map.empty)
  extends Serializable {

  /** The option's rendered text, split by field — the encoder's view when it
    * uses segment-aware pooling (fields the option omits are None).
    */
  def render(c: LakeColumn): Contextualizer.Rendered = {
    val cells = selectCells(c)
    Contextualizer.Rendered(
      title = if (option.useTitle) Some(c.tableTitle) else None,
      colname = if (option.useColName) Some(c.colName) else None,
      stat = if (option.useStat) Some(statText(c, cells)) else None,
      context = if (option.useContext) Some(c.context) else None,
      cells = cells)
  }

  /** Fused stat tokens (nvals…, maxw…): bare numerals would act as strong
    * cross-domain shared features under feature hashing, which a real PLM
    * reading numerals in context does not suffer from.
    */
  private def statText(c: LakeColumn, cells: Seq[String]): String = {
    val lens = cells.map(v => math.max(1, Tokenizer.countTokens(v)))
    val maxL = if (lens.isEmpty) 0 else lens.max
    val minL = if (lens.isEmpty) 0 else lens.min
    val avgL = if (lens.isEmpty) 0.0 else lens.sum.toDouble / lens.size
    s"nvals${c.cells.size} maxw$maxL minw$minL avgw" + f"$avgL%.1f".replace('.', 'p')
  }

  /** Render the column to the option's single text sequence (Table 1). */
  def text(c: LakeColumn): String = {
    val r = render(c)
    val sb = new StringBuilder
    r.title.foreach(t => sb.append(t).append(". "))
    r.colname.foreach { cn =>
      sb.append(cn)
      r.stat match {
        case Some(st) => sb.append(s" contains $st values: ")
        case None => sb.append(": ")
      }
    }
    sb.append(r.cells.mkString(", ")).append(".")
    r.context.foreach(cx => sb.append(" ").append(cx))
    sb.toString
  }

  /** Cells that fit under the token budget; by corpus frequency if known. */
  private[text] def selectCells(c: LakeColumn): Seq[String] = {
    // Fast path: short columns never exceed the budget.
    if (c.cells.size * 2 <= budgetFor(c)) return c.cells
    val budget = budgetFor(c)
    val ordered =
      if (frequency.isEmpty) c.cells
      else c.cells.zipWithIndex
        .sortBy { case (v, i) => (-frequency.getOrElse(v, 0L), i.toLong) }
        .map(_._1)
    val out = scala.collection.mutable.ArrayBuffer.empty[String]
    var used = 0
    val it = ordered.iterator
    while (it.hasNext && used < budget) {
      val v = it.next()
      val t = math.max(1, Tokenizer.countTokens(v))
      if (used + t <= budget) { out += v; used += t }
      else used = budget // stop at the first cell that does not fit
    }
    if (out.isEmpty && c.cells.nonEmpty) out += ordered.head
    out.toSeq
  }

  /** Token budget left for cell values after metadata. */
  private def budgetFor(c: LakeColumn): Int = {
    var meta = 1
    if (option.useTitle) meta += Tokenizer.countTokens(c.tableTitle)
    if (option.useColName) meta += Tokenizer.countTokens(c.colName)
    if (option.useStat) meta += 10
    if (option.useContext) meta += Tokenizer.countTokens(c.context)
    math.max(4, maxTokens - meta)
  }
}
