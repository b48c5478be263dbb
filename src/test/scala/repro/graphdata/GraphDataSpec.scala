package repro.graphdata

import repro.SparkSpec
import repro.SparkTestData._
import repro.core.TestGraphs.bruteClosure

/** Generators: determinism, size contracts, and structural properties. */
class GraphDataSpec extends SparkSpec {

  test("erdosRenyi produces the requested number of distinct edges") {
    val df = GraphData.erdosRenyi(spark, n = 200, p = 0.01, seed = 1)
    val m = math.round(200L * 199 / 2.0 * 0.01)
    assert(df.count() == m)
    assert(df.distinct().count() == m)
    val pairs = toPairs(df)
    assert(pairs.forall { case (s, t) => s >= 1 && s <= 200 && t >= 1 && t <= 200 && s != t })
  }

  test("erdosRenyi is deterministic in the seed") {
    val a = toPairs(GraphData.erdosRenyi(spark, 100, 0.02, seed = 5))
    val b = toPairs(GraphData.erdosRenyi(spark, 100, 0.02, seed = 5))
    val c = toPairs(GraphData.erdosRenyi(spark, 100, 0.02, seed = 6))
    assert(a == b)
    assert(a != c)
  }

  test("randomTree is a tree: n-1 edges, every non-root has one parent") {
    val n = 500
    val df = GraphData.randomTree(spark, n, seed = 2)
    val edges = toPairs(df)
    assert(edges.size == n - 1)
    val children = edges.toSeq.map(_._2)
    assert(children.distinct.size == children.size) // unique parent
    assert(!children.contains(1L)) // node 1 is the root
    assert(edges.forall { case (p, c) => p < c }) // parents precede children
  }

  test("tree TC size equals sum of depths (paper's tree_n invariant)") {
    val n = 300
    val edges = toPairs(GraphData.randomTree(spark, n, seed = 3))
    val parent = edges.map(_.swap).toMap
    def depth(v: Long): Int = if (v == 1L) 0 else 1 + depth(parent(v))
    val sumDepths = (1L to n).map(depth(_)).sum
    assert(bruteClosure(edges).size == sumDepths)
  }

  test("withRandomLabels covers all labels and keeps the edge set") {
    val base = GraphData.erdosRenyi(spark, 100, 0.05, seed = 4)
    val labels = (0 until 5).map(i => s"l$i")
    val df = GraphData.withRandomLabels(spark, base, labels, seed = 9)
    assert(df.count() == base.count())
    val preds = df.select("pred").distinct().collect().map(_.getString(0)).toSet
    assert(preds.subsetOf(labels.toSet) && preds.size >= 3)
  }

  test("yagoLite: all query predicates and constants are present") {
    val g = GraphData.yagoLite(spark, scale = 0.2, seed = 1)
    val preds = g.edges.select("pred").distinct().collect().map(_.getString(0)).toSet
    val needed = Set("isLocatedIn", "dealsWith", "isMarriedTo", "livesIn", "hasChild",
      "influences", "hasSuccessor", "hasPredecessor", "hasAcademicAdvisor", "owns",
      "actedIn", "wasBornIn", "isConnectedTo", "type", "rdfs:subClassOf")
    assert(needed.subsetOf(preds), s"missing: ${needed -- preds}")
    val consts = Seq("Japan", "United_States", "USA", "Argentina", "Sweden", "India",
      "Germany", "Netherlands", "Kevin_Bacon", "Jay_Kappraff", "John_Lawrence_Toole",
      "Shannon_Airport", "wikicat_Capitals_in_Europe")
    consts.foreach(c => assert(g.constants.contains(c), c))
    assert(g.nEdges == g.edges.count())
  }

  test("yagoLite: isLocatedIn chains have depth (isLocatedIn+ is non-trivial)") {
    val g = GraphData.yagoLite(spark, scale = 0.2, seed = 1)
    val isl = g.edges.filter(g.edges.col("pred") === "isLocatedIn")
      .select("src", "trg")
    val pairs = toPairs(isl)
    val twoHops = pairs.flatMap { case (a, b) => pairs.collect { case (b2, c) if b2 == b => (a, c) } }
    assert(twoHops.nonEmpty)
  }

  test("uniprotLite: edge count near target, predicates and constants present") {
    val g = GraphData.uniprotLite(spark, nEdges = 5000, seed = 2)
    assert(math.abs(g.nEdges - 5000) < 1500, s"got ${g.nEdges}")
    val preds = g.edges.select("pred").distinct().collect().map(_.getString(0)).toSet
    assert(Set("interacts", "encodes", "occurs", "hasKeyword", "reference",
      "authoredBy", "publishes").subsetOf(preds))
    Seq("P0", "K0", "R0", "J0", "A0").foreach(c => assert(g.constants.contains(c), c))
  }

  test("uniprotLite is deterministic in the seed") {
    val a = GraphData.uniprotLite(spark, 2000, seed = 3)
    val b = GraphData.uniprotLite(spark, 2000, seed = 3)
    assert(a.edges.collect().toSet == b.edges.collect().toSet)
    assert(a.constants == b.constants)
  }

  test("uniprotLite P0 constant points at a protein with interacts edges") {
    val g = GraphData.uniprotLite(spark, 2000, seed = 4)
    val p0 = g.constants("P0").asInstanceOf[Long]
    val cnt = g.edges.filter(g.edges.col("pred") === "interacts")
      .filter(g.edges.col("src") === p0).count()
    assert(cnt >= 1)
  }
}
