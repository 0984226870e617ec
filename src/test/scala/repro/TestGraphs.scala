package repro

import repro.graph.{CsrGraph, GraphGen, Spectral}
import repro.linalg.Dense

/** Shared, lazily cached test fixtures: small graphs with their exact
  * Laplacian pseudo-inverses and spectral radii. Everything here is
  * deterministic, so caching across suites is safe and keeps the run fast
  * (pinv is O(n³), λ is iterative).
  */
object TestGraphs {

  final case class Fixture(name: String, g: CsrGraph) {
    lazy val pinv: Array[Array[Double]] = Dense.laplacianPseudoInverse(g)
    lazy val lambda: Double = Spectral.lambda(g)
    def exactEr(s: Int, t: Int): Double = Dense.erFromPinv(pinv, s, t)
  }

  lazy val complete10   = Fixture("K10", GraphGen.complete(10))
  lazy val complete25   = Fixture("K25", GraphGen.complete(25))
  lazy val cycle9       = Fixture("C9", GraphGen.cycle(9))
  lazy val cycle15      = Fixture("C15", GraphGen.cycle(15))
  lazy val barbell8     = Fixture("barbell8", GraphGen.barbell(8))
  lazy val toy          = Fixture("toyFig2", GraphGen.toyFig2)
  lazy val er200        = Fixture("ER(200,0.05)", GraphGen.erdosRenyi(200, 0.05, seed = 3))
  lazy val ba300        = Fixture("BA(300,4)", GraphGen.barabasiAlbert(300, 4, seed = 5))
  lazy val ba500dense   = Fixture("BA(500,12)", GraphGen.barabasiAlbert(500, 12, seed = 9))

  /** The ergodic (connected + non-bipartite) fixtures most accuracy tests
    * sweep over.
    */
  lazy val ergodic: Seq[Fixture] =
    Seq(complete10, complete25, cycle9, cycle15, barbell8, toy, er200, ba300, ba500dense)

  /** Deterministic query pairs (s, t), s != t, spread across a graph. */
  def pairs(g: CsrGraph, count: Int, seed: Long = 17): Seq[(Int, Int)] = {
    val rng = repro.util.Rng(seed)
    (0 until count).map { _ =>
      val s = rng.nextInt(g.n)
      var t = rng.nextInt(g.n)
      while (t == s) t = rng.nextInt(g.n)
      (s, t)
    }
  }

  /** Deterministic sample of edges of a graph. */
  def edgePairs(g: CsrGraph, count: Int, seed: Long = 23): Seq[(Int, Int)] = {
    val all = g.undirectedEdges.toVector
    val rng = repro.util.Rng(seed)
    (0 until count).map(_ => all(rng.nextInt(all.size)))
  }
}
