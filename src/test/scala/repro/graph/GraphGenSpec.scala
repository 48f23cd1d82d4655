package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class GraphGenSpec extends AnyFunSuite {

  test("six dataset stand-ins exist and mirror Table 1 directedness") {
    assert(GraphGen.datasets.map(_.paperName) ==
      Seq("DBLP", "Web-St", "Pokec", "LJ", "Orkut", "Twitter"))
    assert(GraphGen.datasets.count(!_.directed) == 2) // DBLP, Orkut
  }

  test("generation is deterministic in the seed") {
    val d = GraphGen.tinyDatasets.head
    val g1 = d.generate(seed = 5)
    val g2 = d.generate(seed = 5)
    assert(g1.m == g2.m)
    assert(g1.edges.toSeq == g2.edges.toSeq)
  }

  test("different seeds give different graphs") {
    val d = GraphGen.tinyDatasets.head
    assert(GraphGen.scaleFree(500, 4.0, seed = 1).edges.toSeq !=
           GraphGen.scaleFree(500, 4.0, seed = 2).edges.toSeq)
  }

  test("directed stand-ins land near the target average degree") {
    val g = GraphGen.scaleFree(2000, 8.0, seed = 3)
    assert(g.avgDegree > 5.0 && g.avgDegree < 12.0,
      s"avgDegree=${g.avgDegree} too far from 8.0")
  }

  test("undirected stand-ins are symmetric") {
    val g = GraphGen.scaleFreeUndirected(500, 3.0, seed = 4)
    val edgeSet = (0 until g.n).flatMap(v => g.outNeighbors(v).map(u => (v, u))).toSet
    assert(edgeSet.forall { case (v, u) => edgeSet.contains((u, v)) })
  }

  test("undirected stand-ins have no dead ends") {
    val g = GraphGen.scaleFreeUndirected(500, 3.0, seed = 4)
    assert(g.deadEnds.isEmpty)
  }

  test("directed stand-ins keep a small dead-end fraction") {
    val g = GraphGen.scaleFree(1000, 6.0, seed = 5)
    assert(g.deadEnds.nonEmpty, "expected some dead ends")
    assert(g.deadEnds.length <= g.n / 20, "too many dead ends")
  }

  test("degree distribution is heavy-tailed (max ≫ average)") {
    val g = GraphGen.scaleFree(3000, 10.0, seed = 6)
    val maxDeg = (0 until g.n).map(g.outDegree).max
    assert(maxDeg > 8 * g.avgDegree, s"maxDeg=$maxDeg avg=${g.avgDegree}")
  }

  test("no self loops") {
    val g = GraphGen.scaleFree(800, 5.0, seed = 7)
    assert((0 until g.n).forall(v => !g.outNeighbors(v).contains(v)))
  }

  test("no duplicate edges from a directed generator") {
    val g = GraphGen.scaleFree(800, 5.0, seed = 8)
    assert((0 until g.n).forall { v =>
      val ns = g.outNeighbors(v); ns.distinct.length == ns.length
    })
  }

  test("byName resolves every stand-in and rejects unknowns") {
    GraphGen.datasets.foreach(d => assert(GraphGen.byName(d.name) eq d))
    intercept[NoSuchElementException] { GraphGen.byName("nope") }
  }

  test("tiny stand-ins are at least 60 nodes") {
    assert(GraphGen.tinyDatasets.forall(_.n >= 60))
  }
}
