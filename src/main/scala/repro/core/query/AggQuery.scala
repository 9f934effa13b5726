package repro.core.query

/** One group-by aggregate query over the natural join D of all relations:
  *
  *   SELECT groupBy…, SUM(…) AS m₁, … FROM D [WHERE filters] GROUP BY groupBy…
  *
  * A batch of these is LMFAO's input. Filters are single-attribute predicates
  * (the CART use case); they apply to D as a whole.
  */
final case class AggQuery(
    name: String,
    groupBy: Seq[String],
    measures: Seq[Measure],
    filters: Seq[Predicate] = Nil,
) {
  require(name.nonEmpty, "query name must be non-empty")
  require(measures.nonEmpty, s"query $name needs at least one measure")
  require(groupBy.distinct == groupBy, s"query $name has duplicate group-by attributes")
  require(measures.map(_.name).distinct.size == measures.size, s"query $name has duplicate measure names")
  require(
    measures.forall(m => !groupBy.exists(g => m.name == g)),
    s"query $name: measure names must not collide with group-by attributes")

  /** Every attribute the query touches (group-by, measures, filters). */
  def attrs: Set[String] =
    groupBy.toSet ++ measures.flatMap(_.attrs) ++ filters.map(_.attr)

  /** Output column names, group-by attributes first. */
  def outputColumns: Seq[String] = groupBy ++ measures.map(_.name)
}
