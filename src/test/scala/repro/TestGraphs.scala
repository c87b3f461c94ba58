package repro

import repro.graph.GraphGen

/** Hand-built graphs with known truss structure, shared across suites. */
object TestGraphs {

  /** Single triangle 0-1-2. */
  val triangle: Seq[(Int, Int)] = GraphGen.clique(3)

  /** K4: every edge has 1-support 2, trussness 4. */
  val k4: Seq[(Int, Int)] = GraphGen.clique(4)

  /** K5: every edge has 1-support 3, trussness 5. */
  val k5: Seq[(Int, Int)] = GraphGen.clique(5)

  /** C6: triangle-free; for h=2 every edge has 2-support 2, 2-trussness 4. */
  val c6: Seq[(Int, Int)] = GraphGen.cycle(6)

  /** Path on 5 vertices: no edge has common neighbors at h=1. */
  val path5: Seq[(Int, Int)] = GraphGen.path(5)

  /** Bowtie: two triangles {0,1,2} and {2,3,4} sharing vertex 2. */
  val bowtie: Seq[(Int, Int)] = Seq((0, 1), (0, 2), (1, 2), (2, 3), (2, 4), (3, 4))

  /** K4 and a pendant edge hanging off vertex 0. */
  val k4Pendant: Seq[(Int, Int)] = GraphGen.clique(4) :+ (0, 4)

  /** Two K4s joined by a single bridge edge — clear truss hierarchy. */
  val twoCliquesBridge: Seq[(Int, Int)] =
    GraphGen.clique(4) ++ GraphGen.clique(4, offset = 4) :+ (3, 4)

  /** Star K1,5: triangle-free, diameter 2. */
  val star5: Seq[(Int, Int)] = (1 to 5).map(i => (0, i))

  /** Disconnected: a triangle and a separate edge. */
  val triPlusEdge: Seq[(Int, Int)] = triangle :+ (10, 11)

  /** The motivating-example shape of the paper's Figure 1 (14 nodes, two
    * dense communities and a sparse tail): not the exact toy graph (the
    * figure is an image) but the same size and flavour — used for smoke
    * tests, with correctness asserted against BruteForce, not the figure.
    */
  val fig1Like: Seq[(Int, Int)] =
    GraphGen.clique(5) ++ GraphGen.clique(5, offset = 5) ++
      Seq((4, 5), (9, 10), (10, 11), (11, 12), (12, 13), (13, 10), (0, 13))

  /** A pool of diverse small random graphs for cross-validation sweeps. */
  def randomPool(count: Int, maxN: Int, seed: Long): Seq[Seq[(Int, Int)]] =
    (0 until count).map { i =>
      val s = seed + i
      val n = 8 + ((s * 7919) % (maxN - 8)).toInt.abs
      (i % 4) match {
        case 0 => GraphGen.erdosRenyi(n, 2 * n, s)
        case 1 => GraphGen.chungLu(n, 2 * n, 2.3, s)
        case 2 => GraphGen.smallWorld(math.max(n, 8), 4, 0.2, s)
        case _ => GraphGen.plantedCommunities(2, math.max(4, n / 2), 0.7, 3, s)
      }
    }
}
