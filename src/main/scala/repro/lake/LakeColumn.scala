package repro.lake

/** One column crawled from the (synthetic) data lake.
  *
  * @param corpus  corpus id ("E" enterprise-like, "G" government-like)
  * @param tableId id of the file/table the column came from (FD mining joins
  *                columns of the same table)
  * @param colId   globally unique column id
  * @param name    column name
  * @param domain  ground-truth generating domain (empty for ad-hoc/impure
  *                columns; "nl:*" for natural-language domains). Used only by
  *                evaluation, never by inference.
  * @param values  the column's values, in arrival order
  */
final case class LakeColumn(
    corpus: String,
    tableId: String,
    colId: String,
    name: String,
    domain: String,
    values: Seq[String])
