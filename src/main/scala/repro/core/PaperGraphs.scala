package repro.core

import repro.graph.LocalGraph

/** Graph fixtures reconstructed from the paper's running examples.
  *
  * The paper gives enough constraints (Table 2 distance sets, Example 5's
  * butterfly degrees, Example 6's degree updates) to pin down the Figure 3
  * graph exactly up to irrelevant symmetry; the Figure 1/2 graph is built to
  * satisfy every property the text asserts about it (core contents, expected
  * BCC answer). Used as ground truth in unit tests.
  */
object PaperGraphs {

  /** Stable external ids for the Figure 3 fixture. */
  object Fig3Ids {
    val ql = 0L; val v1 = 1L; val v2 = 2L; val v3 = 3L
    val qr = 10L
    val u1 = 11L; val u2 = 12L; val u3 = 13L; val u4 = 14L; val u5 = 15L
    val u6 = 16L; val u7 = 17L; val u9 = 19L
  }

  /** Figure 3 graph (Examples 4-6, Table 2): labels SE (left) and UI (right).
    *
    * Cross (bipartite) edges: v1 and v3 each to {u2, u3, u5, u6}, giving the
    * paper's butterfly degrees chi(v1)=chi(v3)=6, chi(u2)=chi(u3)=chi(u5)=
    * chi(u6)=3. Intra edges reproduce Table 2's distance sets before and
    * after deleting u9.
    */
  def figure3: LocalGraph = {
    import Fig3Ids._
    val vertices = Seq(
      ql -> "SE", v1 -> "SE", v2 -> "SE", v3 -> "SE",
      qr -> "UI", u1 -> "UI", u2 -> "UI", u3 -> "UI", u4 -> "UI",
      u5 -> "UI", u6 -> "UI", u7 -> "UI", u9 -> "UI")
    val intraL = Seq(ql -> v1, ql -> v2, ql -> v3, v1 -> v2)
    val intraR = Seq(
      qr -> u1, qr -> u2, qr -> u3, qr -> u9,
      u1 -> u5, u4 -> u5, u4 -> u9, u5 -> u7, u7 -> u9)
    val cross = for (l <- Seq(v1, v3); r <- Seq(u2, u3, u5, u6)) yield l -> r
    LocalGraph(vertices, intraL ++ intraR ++ cross)
  }

  /** Stable external ids for the Figure 1/2 fixture. */
  object Fig1Ids {
    val ql = 100L
    val v = (1 to 10).map(i => i.toLong).toArray // v(0) = v1 .. v(9) = v10
    val qr = 200L
    val u = (1 to 7).map(i => 110L + i).toArray // u(0) = u1 .. u(6) = u7
    val z1 = 300L
  }

  /** Figure 1 graph: SE group with a 4-core {ql, v1..v5} (K6 minus a perfect
    * matching) and a peelable periphery v6..v10; UI group with a 3-core
    * {qr, u1..u3} (K4) and a peelable chain u4..u7; a PM vertex z1; and the
    * Figure 2 butterfly {ql, v5} x {qr, u3} as the only SE-UI cross edges.
    *
    * The expected (4, 3, 1)-BCC for Q = {ql, qr} is exactly Figure 2:
    * {ql, v1..v5, qr, u1, u2, u3}.
    */
  def figure1: LocalGraph = {
    import Fig1Ids._
    val vertices =
      Seq(ql -> "SE") ++ v.map(_ -> "SE") ++
        Seq(qr -> "UI") ++ u.map(_ -> "UI") ++ Seq(z1 -> "PM")
    // SE core: K6 on {ql, v1..v5} minus matching (ql,v3), (v1,v4), (v2,v5)
    val coreSE = Seq(ql, v(0), v(1), v(2), v(3), v(4))
    val matching = Set((ql, v(2)), (v(0), v(3)), (v(1), v(4)))
    val seCore = for {
      i <- coreSE.indices; j <- coreSE.indices if i < j
      a = coreSE(i); b = coreSE(j)
      if !matching.contains((a, b)) && !matching.contains((b, a))
    } yield a -> b
    // SE periphery: 5-cycle v6..v10 with chords; attaches at v5 and v4
    val sePeriph = Seq(
      v(5) -> v(6), v(6) -> v(7), v(7) -> v(8), v(8) -> v(9), v(9) -> v(5),
      v(5) -> v(7), v(6) -> v(8), v(7) -> v(9),
      v(5) -> v(4), v(9) -> v(3))
    // UI core: K4 on {qr, u1, u2, u3}
    val coreUI = Seq(qr, u(0), u(1), u(2))
    val uiCore = for (i <- coreUI.indices; j <- coreUI.indices if i < j)
      yield coreUI(i) -> coreUI(j)
    // UI periphery: chain u4..u7 hung off the core (peels under k=3)
    val uiPeriph = Seq(
      u(3) -> u(4), u(4) -> u(5), u(5) -> u(6),
      u(3) -> u(0), u(3) -> u(1), u(4) -> u(2))
    // PM vertex
    val pm = Seq(z1 -> u(5), z1 -> u(6))
    // cross SE-UI: the Figure 2 butterfly
    val cross = Seq(ql -> qr, ql -> u(2), v(4) -> qr, v(4) -> u(2))
    LocalGraph(vertices, seCore ++ sePeriph ++ uiCore ++ uiPeriph ++ pm ++ cross)
  }

  /** Expected Figure 2 community for `figure1` with params (4, 3, 1). */
  def figure2Community: Set[Long] = {
    import Fig1Ids._
    Set(ql, v(0), v(1), v(2), v(3), v(4), qr, u(0), u(1), u(2))
  }

  /** NP-hardness reduction gadget (Theorem 1): given a plain graph, build
    * G' = G (label l1) + a copy Gc (label l2) + the complete bipartite edge
    * set between them. The gadget has a (k-1, k-1, 1)-BCC of diameter 1 iff
    * the source graph has a k-clique.
    */
  def cliqueGadget(vertices: Seq[Long], edges: Seq[(Long, Long)]): LocalGraph = {
    val offset = vertices.max + 1
    val vs = vertices.map(_ -> "l1") ++ vertices.map(v => (v + offset) -> "l2")
    val es = edges ++ edges.map { case (a, b) => (a + offset, b + offset) } ++
      (for (a <- vertices; b <- vertices) yield (a, b + offset))
    LocalGraph(vs, es)
  }
}
