package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.rdf.{Sparql, SparqlParser}

class GraphPatternSpec extends AnyFunSuite {

  test("subquery counts per (d, h) variation") {
    assert(GraphPattern(1, 1).queries("Paper").size == 1)
    assert(GraphPattern(2, 1).queries("Paper").size == 2)
    assert(GraphPattern(1, 2).queries("Paper").size == 2)
    assert(GraphPattern(2, 2).queries("Paper").size == 6)
  }

  test("every subquery projects exactly (s, p, o)") {
    for {
      d <- Seq(1, 2); h <- Seq(1, 2)
      q <- GraphPattern(d, h).queries("Paper")
    } assert(q.projected == Seq("s", "p", "o"), s"d$d h$h: ${Sparql.render(q)}")
  }

  test("rendered subqueries round-trip through the parser") {
    for {
      d <- Seq(1, 2); h <- Seq(1, 2)
      q <- GraphPattern(d, h).queries("CreativeWork")
    } assert(SparqlParser.parse(Sparql.render(q)) == q)
  }

  test("d1h1 renders the paper's outgoing-only BGP") {
    val text = Sparql.render(GraphPattern(1, 1).queries("Paper").head)
    assert(text == "SELECT ?s ?p ?o WHERE { ?s a <type:Paper> . ?s ?p ?o }")
  }

  test("d2h1 includes the incoming-predicate subquery") {
    val texts = GraphPattern(2, 1).queries("Paper").map(Sparql.render)
    assert(texts.exists(_.contains("?s ?p ?o . ?o a <type:Paper>")))
  }

  test("LP queries add the bridge pattern over the target predicate") {
    val qs = GraphPattern(2, 1).lpQueries("Author", "Affiliation", "authorAff")
    assert(qs.size == 5) // 2 per type + bridge
    val bridge = Sparql.render(qs.last)
    assert(bridge.contains("<rel:authorAff>"))
  }

  test("LP queries collapse type duplication when both ends share a type") {
    val qs = GraphPattern(1, 1).lpQueries("Person", "Person", "knows")
    assert(qs.size == 2) // one per-type layer + bridge
  }

  test("invalid parameters are rejected") {
    intercept[IllegalArgumentException](GraphPattern(0, 1))
    intercept[IllegalArgumentException](GraphPattern(3, 1))
    intercept[IllegalArgumentException](GraphPattern(1, 0))
    intercept[IllegalArgumentException](GraphPattern(1, 3))
  }
}
