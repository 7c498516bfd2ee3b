package repro.rdf

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Compiles a SPARQL-subset [[Query]] to Catalyst joins over a
  * [[TripleStore]]'s index views.
  *
  * View choice per triple pattern mirrors an RDF engine's index pick:
  * bound predicate → [[TripleStore.byP]], bound subject → [[TripleStore.byS]],
  * bound object → [[TripleStore.byO]], otherwise the raw triples. The
  * ``rdf:type`` predicate routes to the virtual type-triple view.
  *
  * Variable-predicate patterns match only data triples (not the virtual
  * type triples); node types travel in the node-type table instead.
  */
final class BGPExecutor(store: TripleStore) {

  /** Execute a query; result columns are the projected variable names, all
    * LongType. Bag semantics (no implicit DISTINCT), as in SPARQL SELECT.
    */
  def execute(q: Query): DataFrame = {
    val bound = group(q.where)
    val projected = q.projected.map(col)
    var df = bound.select(projected: _*)
    if (q.limit.isDefined || q.offset.isDefined) {
      // LIMIT/OFFSET need a total order to be meaningful; order by all
      // projected columns (deterministic given set semantics upstream).
      df = df.orderBy(q.projected.map(col): _*)
      q.offset.foreach(n => df = df.offset(n.toInt))
      q.limit.foreach(n => df = df.limit(n.toInt))
    }
    df
  }

  private def group(g: GroupPattern): DataFrame = g match {
    case BGP(patterns) =>
      patterns.map(scan).reduce { (acc, nxt) =>
        val common = acc.columns.intersect(nxt.columns).toSeq
        if (common.nonEmpty) acc.join(nxt, common) else acc.crossJoin(nxt)
      }
    case Union(branches) =>
      val dfs = branches.map(group)
      val allVars = g.vars
      // SPARQL UNION aligns by variable name; missing vars would be unbound
      // (null) — our extraction queries always use identical var sets.
      dfs.map(df => df.select(allVars.map(v => colOrNull(df, v)): _*)).reduce(_ union _)
  }

  private def colOrNull(df: DataFrame, v: String): Column =
    if (df.columns.contains(v)) col(v) else lit(null).cast("long").as(v)

  /** One pattern: pick the index view, push constant filters, rename the
    * variable positions; result has one LongType column per variable.
    */
  private def scan(tp: TriplePattern): DataFrame = {
    val base = tp.p match {
      case iri: IRI if iri.name == "rdf:type" => store.typeTriples
      case iri: IRI                           => store.byP.filter(col("p") === store.resolve(iri).toInt)
      case _: Var =>
        tp.s match {
          case _: IRI => store.byS
          case _ =>
            tp.o match {
              case _: IRI => store.byO
              case _      => store.triples
            }
        }
    }
    var df = base
    // constant filters for subject/object
    tp.s match { case iri: IRI => df = df.filter(col("s") === store.resolve(iri)); case _ => () }
    tp.o match { case iri: IRI => df = df.filter(col("o") === store.resolve(iri)); case _ => () }
    // repeated variable inside one pattern → equality filter
    (tp.s, tp.o) match {
      case (Var(a), Var(b)) if a == b => df = df.filter(col("s") === col("o"))
      case _                          => ()
    }
    val named = Seq(
      tp.s match { case Var(n) => Some(n -> col("s")); case _ => None },
      tp.p match { case Var(n) => Some(n -> col("p")); case _ => None },
      tp.o match { case Var(n) => Some(n -> col("o")); case _ => None },
    ).flatten
    require(named.nonEmpty, s"pattern $tp binds no variables")
    // a var repeated inside one pattern projects once (first occurrence)
    val distinctCols = named
      .groupBy(_._1).view.mapValues(_.head._2).toSeq
      .map { case (n, c) => c.cast("long").as(n) }
    df.select(distinctCols: _*)
  }
}
