package repro.core.lang

import org.scalatest.funsuite.AnyFunSuite

class GraphSpec extends AnyFunSuite {

  private val cfg = GraphConfig()

  test("Figure 2: graph of Street -> St has nodes 1..3 and edges (1,2),(2,3),(1,3)") {
    val g = GraphBuilder.build(0, "Street", "St", cfg)
    assert(g.lastNode == 3)
    assert(g.edges.keySet == Set((1, 2), (2, 3), (1, 3)))
  }

  test("Figure 2: edge (1,2) contains ConstantStr(S) and SubStr to the 'S'") {
    val g      = GraphBuilder.build(0, "Street", "St", cfg)
    val labels = g.edges((1, 2))
    assert(labels.contains(ConstantStr("S")))
    assert(labels.contains(SubStrF(MatchPos(Tc, 1, 'B'), MatchPos(Tc, 1, 'E'))))
  }

  test("Figure 2 / Example 4.7: edge (2,3) carries Prefix(Tl, 1)") {
    val g = GraphBuilder.build(0, "Street", "St", cfg)
    assert(g.edges((2, 3)).contains(PrefixF(Tl, 1)))
  }

  test("Avenue -> Ave carries Prefix(Tl, 1) for 've' (Example 4.7)") {
    val g = GraphBuilder.build(0, "Avenue", "Ave", cfg)
    assert(g.edges((2, 4)).contains(PrefixF(Tl, 1)))
  }

  test("every edge label actually outputs the edge substring") {
    for (tr <- Seq(("Street", "St"), ("9 St", "9th St"), ("David Dewitt", "Dr. Dewitt, D."))) {
      val g = GraphBuilder.build(0, tr._1, tr._2, cfg)
      for (((i, j), labels) <- g.edges; l <- labels) {
        val sub = tr._2.substring(i - 1, j - 1)
        assert(Label.canOutput(l, tr._1, sub), s"label ${l.key} on edge ($i,$j) of $tr")
      }
    }
  }

  test("affix labels disabled by config") {
    val g = GraphBuilder.build(0, "Street", "St", cfg.copy(affix = false))
    val all = g.edges.values.flatten
    assert(!all.exists { case _: PrefixF | _: SuffixF => true; case _ => false })
  }

  test("affix labels only keep the longest prefix at a given start") {
    // t = "Ave": at node 2 the longest prefix of "venue" is "ve" -> edge (2,4),
    // so edge (2,3) must NOT carry Prefix(Tl, 1) (Appendix B static order).
    val g = GraphBuilder.build(0, "Avenue", "Ave", cfg)
    assert(!g.edges((2, 3)).contains(PrefixF(Tl, 1)))
  }

  test("suffix label present: treet -> eet") {
    val g = GraphBuilder.build(0, "Street Q", "eet", cfg)
    assert(g.edges((1, 4)).contains(SuffixF(Tl, 1)))
  }

  test("degenerate graph for overlong sides") {
    val long = "x" * 100
    val g = GraphBuilder.build(0, long, "ab", cfg)
    assert(g.edges == Map((1, 3) -> Vector(ConstantStr("ab"))))
  }

  test("empty rhs yields a graph with no edges") {
    val g = GraphBuilder.build(0, "something", "", cfg)
    assert(g.edges.isEmpty && g.lastNode == 1)
  }

  test("empty lhs yields ConstantStr-only labels") {
    val g = GraphBuilder.build(0, "", "th", cfg)
    assert(g.edges.nonEmpty)
    for ((_, labels) <- g.edges; l <- labels)
      assert(l.isInstanceOf[ConstantStr], l.key)
  }

  test("label caps are respected") {
    val tight = cfg.copy(maxLabelsPerEdge = 3, maxPosFnsPerPosition = 2)
    val g = GraphBuilder.build(0, "9 St, 02141 Wisconsin WI", "9th WI WI", tight)
    assert(g.edges.values.forall(_.size <= 3))
  }

  test("adjacency lists sorted farthest-first") {
    val g = GraphBuilder.build(0, "Street", "St", cfg)
    assert(g.outEdges(1).map(_._1) == Vector(3, 2))
  }

  test("position functions: constant-term ranking keeps the top-scored term") {
    val score: String => Double = { case "Dr." => 5.0; case _ => 0.0 }
    val pf = GraphBuilder.positionFunctions("Dr. Dewitt", GraphConfig(), score)
    assert(pf(1).contains(MatchPos(TStr("Dr."), 1, 'B')))
    assert(pf(4).contains(MatchPos(TStr("Dr."), 1, 'E')))
  }

  test("position functions include forward and backward regex MatchPos and ConstPos") {
    val pf = GraphBuilder.positionFunctions("9 St", GraphConfig(), _ => 0.0)
    assert(pf(1).contains(MatchPos(Td, 1, 'B')))
    assert(pf(1).contains(MatchPos(Td, -1, 'B')))
    assert(pf(1).contains(ConstPos(1)))
    assert(pf(5).contains(MatchPos(Tl, 1, 'E'))) // end of "t" run = position 5
  }

  test("every position function evaluates to its position") {
    val s  = "9th E Ave, 02141"
    val pf = GraphBuilder.positionFunctions(s, GraphConfig(), _ => 0.0)
    for ((x, ps) <- pf; p <- ps)
      assert(Pos.eval(p, s) == Some(x), s"pos fn ${p.key} at $x")
  }
}
