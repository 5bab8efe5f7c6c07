package repro.datalog

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col

/** Binds relation names used in Datalog atoms to DataFrames and exposes
  * per-attribute domains.
  *
  * The paper (§5.2) assumes the user specifies the domain `D_A` of every
  * attribute `A` as a unary query; the "reasonable default" is the set of
  * distinct values occurring in that attribute (active domain, §2.1). We
  * mirror that: `domain(rel, pos)` defaults to the distinct values of the
  * column but can be overridden per attribute.
  */
final class Catalog(
    relations: Map[String, DataFrame],
    domainOverrides: Map[(String, Int), DataFrame] = Map.empty,
) extends Serializable {

  def relation(name: String): DataFrame =
    relations.getOrElse(name, sys.error(s"unknown relation: $name"))

  def has(name: String): Boolean = relations.contains(name)

  def columns(name: String): Seq[String] = relation(name).columns.toSeq

  def arity(name: String): Int = relation(name).columns.length

  /** Domain `D_A` for attribute at position `pos` (0-based) of `rel`:
    * a single-column DataFrame named "v".
    */
  def domain(rel: String, pos: Int): DataFrame =
    domainOverrides.get((rel, pos)) match {
      case Some(df) => df.toDF("v")
      case None =>
        val c = columns(rel)(pos)
        relation(rel).select(col(c).as("v")).where(col("v").isNotNull).distinct()
    }

  def withRelation(name: String, df: DataFrame): Catalog =
    new Catalog(relations + (name -> df), domainOverrides)

  def withDomain(rel: String, pos: Int, dom: DataFrame): Catalog =
    new Catalog(relations, domainOverrides + ((rel, pos) -> dom))

  def relationNames: Set[String] = relations.keySet

  /** Validate that every atom of the rule refers to a known relation with
    * matching arity — catches schema drift between queries and generators.
    */
  def validate(rule: Rule): Unit =
    rule.atoms.foreach { a =>
      require(has(a.relation), s"rule ${rule.name}: unknown relation ${a.relation}")
      require(arity(a.relation) == a.arity,
        s"rule ${rule.name}: atom $a has arity ${a.arity} but relation " +
          s"${a.relation} has ${arity(a.relation)} columns")
    }
}

object Catalog {
  def apply(rels: (String, DataFrame)*): Catalog = new Catalog(rels.toMap)
}
