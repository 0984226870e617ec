package repro.graph

import repro.SparkSpec

class SpectralSpec extends SparkSpec {

  test("complete graph K_n: lambda = 1/(n-1)") {
    Seq(4, 7, 10, 25).foreach { n =>
      val got = Spectral.lambda(GraphGen.complete(n))
      assert(math.abs(got - 1.0 / (n - 1)) < 1e-6, s"K_$n: got $got")
    }
  }

  test("odd cycle C_n: lambda = cos(pi/n)") {
    Seq(5, 9, 15).foreach { n =>
      val got = Spectral.lambda(GraphGen.cycle(n))
      val expect = math.cos(math.Pi / n) // |λ_n| = cos(π/n) > λ₂ = cos(2π/n)
      assert(math.abs(got - expect) < 1e-6, s"C_$n: got $got, expect $expect")
    }
  }

  test("lambda is within (0, 1) for ergodic graphs") {
    repro.TestGraphs.ergodic.foreach { f =>
      val l = f.lambda
      assert(l > 0.0 && l < 1.0, s"${f.name}: $l")
    }
  }

  test("barbell has lambda close to 1 (slow mixing)") {
    val l = Spectral.lambda(GraphGen.barbell(8))
    assert(l > 0.9, s"got $l")
  }

  test("complete graph mixes faster than barbell") {
    assert(Spectral.lambda(GraphGen.complete(16)) < Spectral.lambda(GraphGen.barbell(8)))
  }

  test("lambda is deterministic") {
    val g = GraphGen.barabasiAlbert(200, 3, seed = 5)
    assert(Spectral.lambda(g) == Spectral.lambda(g))
  }

  test("lambda via eigen-decomposition agrees on a random small graph") {
    // Brute-force reference: power-iterate the dense P on all basis
    // residuals is overkill; instead verify λ against the truncation
    // behaviour it promises — |r − r_ℓ| decays like λ^ℓ. Here we check
    // the direct algebraic property: ||N x|| <= λ ||x|| for x ⊥ u₁.
    val g = GraphGen.erdosRenyi(60, 0.1, seed = 2)
    val lambda = Spectral.lambda(g)
    val n = g.n
    val sqrtDeg = Array.tabulate(n)(v => math.sqrt(g.degree(v).toDouble))
    val norm2m = math.sqrt(2.0 * g.m)
    val u1 = Array.tabulate(n)(v => sqrtDeg(v) / norm2m)
    val rng = repro.util.Rng(99)
    (0 until 10).foreach { _ =>
      val x = Array.fill(n)(rng.nextDouble() - 0.5)
      val dot = (0 until n).map(i => x(i) * u1(i)).sum
      (0 until n).foreach(i => x(i) -= dot * u1(i))
      val xNorm = math.sqrt(x.map(v => v * v).sum)
      val y = new Array[Double](n)
      (0 until n).foreach { v =>
        var acc = 0.0
        g.neighborsOf(v).foreach(u => acc += x(u) / sqrtDeg(u))
        y(v) = acc / sqrtDeg(v)
      }
      val yNorm = math.sqrt(y.map(v => v * v).sum)
      assert(yNorm <= (lambda + 1e-7) * xNorm,
        s"contraction violated: ||Nx||=$yNorm > λ||x||=${lambda * xNorm}")
    }
  }

  test("distributed lambda agrees with local on the toy graph") {
    val g = GraphGen.toyFig2
    val local = Spectral.lambda(g)
    // Loose tol: every distributed iteration is a Spark job; 60 rounds of
    // N² already give ~3 correct digits, which is what Eq. (6) needs.
    val dist = Spectral.lambdaDistributed(spark, GraphGen.toEdgeDf(spark, g), tol = 1e-6, maxIter = 60)
    assert(math.abs(local - dist) < 1e-2, s"local=$local dist=$dist")
  }

  test("distributed lambda agrees with local on K_8") {
    val g = GraphGen.complete(8)
    val local = Spectral.lambda(g)
    val dist = Spectral.lambdaDistributed(spark, GraphGen.toEdgeDf(spark, g), tol = 1e-7, maxIter = 40)
    assert(math.abs(local - dist) < 1e-3, s"local=$local dist=$dist")
  }
}
