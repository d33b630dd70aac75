package repro.data

import scala.collection.mutable
import scala.util.Random
import repro.graph.LocalGraph

/** Deterministic synthetic labeled graphs with planted ground-truth
  * communities — the dataset substitutions documented in DESIGN.md §4.
  *
  * The 2-label networks follow the paper's labeling protocol for the SNAP
  * graphs: every planted community is split into two labeled halves, halves
  * are internally dense, ~10% of intra edges are duplicated as cross edges
  * inside the community (with guaranteed leader butterflies), and ~10%
  * global noise edges are added. The multi-label networks model the Baidu
  * graphs: teams (one label each) plus cross-team "project" communities.
  */
object GraphGen {

  /** A planted 2-label ground-truth community. */
  final case class Community(id: Int, left: Set[Long], right: Set[Long]) {
    def all: Set[Long] = left ++ right
  }

  /** A 2-label planted graph plus its ground truth. */
  final case class Planted(graph: LocalGraph, communities: Vector[Community])

  /** A multi-label ground-truth community: label -> project members. */
  final case class MultiCommunity(id: Int, groups: Map[String, Set[Long]]) {
    def all: Set[Long] = groups.values.flatten.toSet
  }

  /** A multi-label planted graph plus its ground truth. */
  final case class PlantedMulti(graph: LocalGraph, communities: Vector[MultiCommunity])

  /** Tunables for a 2-label planted-partition network. */
  final case class SnapParams(
      name: String,
      nCommunities: Int,
      sizeMin: Int,
      sizeMax: Int,
      intraAvgDeg: Int,
      crossFrac: Double,
      noiseFrac: Double,
      seed: Long)

  /** Ring + random extra edges within a vertex block: connected, average
    * degree ~= `avgDeg`.
    */
  private def denseBlock(ids: IndexedSeq[Long], avgDeg: Int, rnd: Random,
      edges: mutable.Buffer[(Long, Long)]): Unit = {
    val n = ids.length
    if (n < 2) return
    for (i <- 0 until n) edges += ((ids(i), ids((i + 1) % n)))
    val extra = math.max(0, n * avgDeg / 2 - n)
    var added = 0
    var tries = 0
    while (added < extra && tries < extra * 10) {
      tries += 1
      val a = ids(rnd.nextInt(n)); val b = ids(rnd.nextInt(n))
      if (a != b) { edges += ((a, b)); added += 1 }
    }
  }

  /** Build a 2-label planted network (labels "A" and "B"). */
  def planted2Label(p: SnapParams): Planted = {
    val rnd = new Random(p.seed)
    val vertices = mutable.Buffer[(Long, String)]()
    val edges = mutable.Buffer[(Long, Long)]()
    val comms = Vector.newBuilder[Community]
    var nextId = 0L
    for (c <- 0 until p.nCommunities) {
      val size = p.sizeMin + rnd.nextInt(p.sizeMax - p.sizeMin + 1)
      val leftN = math.max(2, size / 2)
      val rightN = math.max(2, size - leftN)
      val left = (0 until leftN).map(_ => { val id = nextId; nextId += 1; id })
      val right = (0 until rightN).map(_ => { val id = nextId; nextId += 1; id })
      left.foreach(id => vertices += ((id, "A")))
      right.foreach(id => vertices += ((id, "B")))
      val before = edges.length
      denseBlock(left, p.intraAvgDeg, rnd, edges)
      denseBlock(right, p.intraAvgDeg, rnd, edges)
      val intraCount = edges.length - before
      // leader butterfly: 2x2 biclique between the first two of each half
      edges += ((left(0), right(0))); edges += ((left(0), right(1)))
      edges += ((left(1), right(0))); edges += ((left(1), right(1)))
      // extra random cross edges inside the community (~crossFrac of intra)
      val nCross = (intraCount * p.crossFrac).toInt
      for (_ <- 0 until nCross)
        edges += ((left(rnd.nextInt(leftN)), right(rnd.nextInt(rightN))))
      comms += Community(c, left.toSet, right.toSet)
    }
    // global noise edges (~noiseFrac of all edges so far)
    val n = nextId
    val nNoise = (edges.length * p.noiseFrac).toInt
    for (_ <- 0 until nNoise) {
      val a = rnd.nextLong(n); val b = rnd.nextLong(n)
      if (a != b) edges += ((a, b))
    }
    Planted(LocalGraph(vertices.toSeq, edges.toSeq), comms.result())
  }

  /** The seven evaluation networks at repro scale (DESIGN.md §4/§8). */
  val snapPresets: Map[String, SnapParams] = Map(
    "amazon-lite" -> SnapParams("amazon-lite", 160, 8, 16, 4, 0.10, 0.10, 11L),
    "dblp-lite" -> SnapParams("dblp-lite", 120, 12, 28, 6, 0.10, 0.10, 12L),
    "youtube-lite" -> SnapParams("youtube-lite", 150, 10, 30, 2, 0.05, 0.60, 13L),
    "livejournal-lite" -> SnapParams("livejournal-lite", 180, 14, 32, 8, 0.10, 0.10, 14L),
    "orkut-lite" -> SnapParams("orkut-lite", 200, 16, 40, 10, 0.10, 0.08, 15L))

  /** Convenience: generate a preset network by name. */
  def snapLike(name: String): Planted = planted2Label(snapPresets(name))

  /** Tunables for a Baidu-like multi-team network. */
  final case class BaiduParams(
      name: String,
      nTeams: Int,
      teamSizeMin: Int,
      teamSizeMax: Int,
      nProjects: Int,
      teamsPerProjectMin: Int,
      teamsPerProjectMax: Int,
      membersPerTeam: Int,
      seed: Long)

  /** Build a multi-label "IT professional network": one label per team,
    * dense intra-team structure, and planted cross-team projects whose
    * per-team member subsets are extra-densified and linked by leader
    * butterflies between every pair of participating teams.
    */
  def baiduLike(p: BaiduParams): PlantedMulti = {
    val rnd = new Random(p.seed)
    val vertices = mutable.Buffer[(Long, String)]()
    val edges = mutable.Buffer[(Long, Long)]()
    var nextId = 0L
    val teamMembers = (0 until p.nTeams).map { t =>
      val size = p.teamSizeMin + rnd.nextInt(p.teamSizeMax - p.teamSizeMin + 1)
      val ids = (0 until size).map(_ => { val id = nextId; nextId += 1; id })
      ids.foreach(id => vertices += ((id, s"T$t")))
      denseBlock(ids, 4, rnd, edges)
      ids
    }
    val comms = Vector.newBuilder[MultiCommunity]
    for (pr <- 0 until p.nProjects) {
      val m = p.teamsPerProjectMin + rnd.nextInt(p.teamsPerProjectMax - p.teamsPerProjectMin + 1)
      val teams = rnd.shuffle((0 until p.nTeams).toList).take(m)
      val groups = teams.map { t =>
        val members = rnd.shuffle(teamMembers(t).toList).take(p.membersPerTeam).toIndexedSeq
        denseBlock(members, 5, rnd, edges) // project members collaborate more
        (s"T$t", members)
      }
      // leader butterflies between every pair of participating teams
      for (i <- groups.indices; j <- i + 1 until groups.length) {
        val a = groups(i)._2; val b = groups(j)._2
        edges += ((a(0), b(0))); edges += ((a(0), b(1)))
        edges += ((a(1), b(0))); edges += ((a(1), b(1)))
        // sprinkle extra cross collaboration
        for (_ <- 0 until a.length / 2)
          edges += ((a(rnd.nextInt(a.length)), b(rnd.nextInt(b.length))))
      }
      comms += MultiCommunity(pr, groups.map { case (l, ms) => l -> ms.toSet }.toMap)
    }
    // global noise
    val nNoise = edges.length / 10
    for (_ <- 0 until nNoise) {
      val a = rnd.nextLong(nextId); val b = rnd.nextLong(nextId)
      if (a != b) edges += ((a, b))
    }
    PlantedMulti(LocalGraph(vertices.toSeq, edges.toSeq), comms.result())
  }

  val baiduPresets: Map[String, BaiduParams] = Map(
    "baidu1-lite" -> BaiduParams("baidu1-lite", 40, 18, 40, 30, 2, 4, 8, 21L),
    "baidu2-lite" -> BaiduParams("baidu2-lite", 60, 24, 60, 50, 2, 7, 8, 22L))

  def baiduLike(name: String): PlantedMulti = baiduLike(baiduPresets(name))

  /** Case-study stand-in for the flight network: labels = countries, dense
    * domestic hubs + spokes, international hub-hub butterflies.
    */
  def flightLike(nCountries: Int = 20, seed: Long = 31L): LocalGraph = {
    val rnd = new Random(seed)
    val vertices = mutable.Buffer[(Long, String)]()
    val edges = mutable.Buffer[(Long, Long)]()
    var nextId = 0L
    val hubs = (0 until nCountries).map { c =>
      val nCities = 12 + rnd.nextInt(19)
      val ids = (0 until nCities).map(_ => { val id = nextId; nextId += 1; id })
      ids.foreach(id => vertices += ((id, s"C$c")))
      val hub = ids.take(4)
      // hubs form a clique; spokes attach to >= 3 hubs/cities
      for (i <- hub.indices; j <- i + 1 until hub.length) edges += ((hub(i), hub(j)))
      for (s <- ids.drop(4)) {
        val targets = rnd.shuffle(ids.filter(_ != s).toList).take(3 + rnd.nextInt(3))
        targets.foreach(t => edges += ((s, t)))
      }
      hub
    }
    for (i <- 0 until nCountries; j <- i + 1 until nCountries if rnd.nextDouble() < 0.3) {
      val a = hubs(i); val b = hubs(j)
      if (rnd.nextDouble() < 0.4) {
        // strong corridor: full 3x3 hub biclique (hub butterfly degree 6)
        for (x <- a.take(3); y <- b.take(3)) edges += ((x, y))
      } else {
        edges += ((a(0), b(0))); edges += ((a(0), b(1)))
        edges += ((a(1), b(0))); edges += ((a(1), b(1)))
      }
    }
    LocalGraph(vertices.toSeq, edges.toSeq)
  }

  /** Case-study stand-in for the 2-camp fiction network: two camps with
    * leader cliques, family clusters, and cross-camp hostility butterflies.
    */
  def potterLike(seed: Long = 41L): LocalGraph = {
    val rnd = new Random(seed)
    val vertices = mutable.Buffer[(Long, String)]()
    val edges = mutable.Buffer[(Long, Long)]()
    var nextId = 0L
    def camp(label: String, size: Int): IndexedSeq[Long] = {
      val ids = (0 until size).map(_ => { val id = nextId; nextId += 1; id })
      ids.foreach(id => vertices += ((id, label)))
      val leaders = ids.take(4)
      for (i <- leaders.indices; j <- i + 1 until leaders.length)
        edges += ((leaders(i), leaders(j)))
      for (v <- ids.drop(4)) {
        val targets = rnd.shuffle(ids.filter(_ != v).toList).take(3 + rnd.nextInt(3))
        targets.foreach(t => edges += ((v, t)))
      }
      ids
    }
    val good = camp("justice", 35)
    val evil = camp("evil", 30)
    // hostility butterflies among the leader trios (3x3 biclique)
    for (x <- good.take(3); y <- evil.take(3)) edges += ((x, y))
    for (_ <- 0 until 25)
      edges += ((good(rnd.nextInt(good.length)), evil(rnd.nextInt(evil.length))))
    LocalGraph(vertices.toSeq, edges.toSeq)
  }

  /** Plain random labeled graph (property tests). */
  def randomLabeled(
      n: Int,
      avgDeg: Double,
      labels: Seq[String],
      seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    val vertices = (0L until n.toLong).map(id => (id, labels(rnd.nextInt(labels.length))))
    val nEdges = (n * avgDeg / 2).toInt
    val edges = (0 until nEdges).flatMap { _ =>
      val a = rnd.nextLong(n.toLong); val b = rnd.nextLong(n.toLong)
      if (a != b) Some((a, b)) else None
    }
    LocalGraph(vertices, edges)
  }
}
