package repro.core.schema

/** A base relation in the multi-relational schema.
  *
  * Natural-join semantics: attributes with the same name in two relations are
  * join attributes. `attrs` lists every attribute of the relation in schema
  * order.
  */
final case class Relation(name: String, attrs: Seq[String]) {
  require(name.nonEmpty, "relation name must be non-empty")
  require(attrs.nonEmpty, s"relation $name must have at least one attribute")
  require(attrs.distinct == attrs, s"relation $name has duplicate attributes")

  def attrSet: Set[String] = attrs.toSet
  def has(attr: String): Boolean = attrSet.contains(attr)
}
