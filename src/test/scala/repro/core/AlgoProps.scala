package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import org.scalacheck.Prop.forAll

/** Algebraic laws the whole framework rests on: G must be a commutative
  * (for MinPlus: idempotent) monoid and F must distribute over G — that
  * distributivity is exactly what makes shortcut weights (Equation 6)
  * composable and Theorems 1-2 sound.
  */
object AlgoProps extends Properties("Algo") {

  private val minA: VCAlgo = SSSP(0)
  private val sumA: VCAlgo = PageRank()
  private val finiteD: Gen[Double] = Gen.choose(-1e6, 1e6)
  private val posW: Gen[Double] = Gen.choose(0.001, 100.0)

  private def monoidLaws(name: String, a: VCAlgo): Unit = {
    property(s"$name: agg associative") = forAll(finiteD, finiteD, finiteD) { (x, y, z) =>
      math.abs(a.agg(a.agg(x, y), z) - a.agg(x, a.agg(y, z))) < 1e-6
    }
    property(s"$name: agg commutative") = forAll(finiteD, finiteD) { (x, y) =>
      a.agg(x, y) == a.agg(y, x)
    }
    property(s"$name: zero is identity of agg") = forAll(finiteD) { x =>
      a.agg(x, a.zero) == x && a.agg(a.zero, x) == x
    }
    property(s"$name: one is identity weight of gen") = forAll(finiteD) { x =>
      a.gen(x, a.one) == x
    }
    property(s"$name: gen distributes over agg") = forAll(finiteD, finiteD, posW) { (x, y, w) =>
      math.abs(a.gen(a.agg(x, y), w) - a.agg(a.gen(x, w), a.gen(y, w))) < 1e-4
    }
  }
  monoidLaws("minplus", minA)
  monoidLaws("sumtimes", sumA)

  property("minplus: agg idempotent") = forAll(finiteD) { x => minA.agg(x, x) == x }

  property("pagerank weights sum to d over out-edges") =
    forAll(Gen.choose(1, 50)) { n =>
      val w = PageRank().edgeWeight(1.0, n, n.toDouble)
      math.abs(w * n - 0.85) < 1e-12
    }

  property("php weights sum to d over out-edges") =
    forAll(Gen.nonEmptyListOf(Gen.choose(0.5, 10.0))) { ws =>
      val a = PHP(0)
      val sw = ws.sum
      val s = ws.map(w => a.edgeWeight(w, ws.size, sw)).sum
      math.abs(s - 0.85) < 1e-9
    }

  property("sssp/bfs weights ignore degree") = forAll(posW, Gen.choose(1, 100)) { (w, n) =>
    SSSP(0).edgeWeight(w, n, w * n) == w && BFS(0).edgeWeight(w, n, w * n) == 1.0
  }

  property("defaultState is fixed point of agg-with-zero") = Prop {
    minA.agg(minA.defaultState, minA.zero) == minA.defaultState &&
    sumA.agg(sumA.defaultState, sumA.zero) == sumA.defaultState
  }
}
