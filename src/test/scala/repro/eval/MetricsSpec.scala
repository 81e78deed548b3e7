package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

/** P@k, R@k, MAP@k (Eq. 12–13), pinned to the paper's worked example and
  * property-checked with ScalaCheck.
  */
class MetricsSpec extends AnyFunSuite {

  /** Runs a ScalaCheck property and fails the ScalaTest test on any
    * counterexample.
    */
  private def check(prop: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(100), prop)
    assert(res.passed, res.status.toString)
  }

  test("paper example: 2 returned, 1 correct, k=10, |T_Q|=20 -> P=1/10, R=1/20") {
    val ranked = Seq("hit", "miss")
    val relevant = (1 to 19).map(i => s"rel$i").toSet + "hit"
    assert(Metrics.precisionAtK(ranked, relevant, 10) === 0.1)
    assert(Metrics.recallAtK(ranked, relevant, 10) === 1.0 / 20.0)
  }

  test("perfect top-k gives P@k = 1") {
    val relevant = Set("a", "b", "c", "d")
    assert(Metrics.precisionAtK(Seq("a", "b", "c"), relevant, 3) === 1.0)
  }

  test("R@k caps at min(k, |T_Q|) / |T_Q|") {
    val relevant = Set("a", "b", "c", "d")
    assert(Metrics.recallAtK(Seq("a", "b"), relevant, 2) === 0.5)
    assert(Metrics.idealRecallAtK(4, 2) === 0.5)
    assert(Metrics.idealRecallAtK(2, 10) === 1.0)
  }

  test("MAP@k is the mean of P@i over i = 1..k") {
    // ranked: hit, miss, hit -> P@1=1, P@2=1/2, P@3=2/3; MAP@3 = (1+0.5+2/3)/3
    val m = Metrics.mapAtK(Seq("a", "x", "b"), Set("a", "b"), 3)
    assert(math.abs(m - (1.0 + 0.5 + 2.0 / 3.0) / 3.0) < 1e-9)
  }

  test("MAP@k of an empty ranking is 0") {
    assert(Metrics.mapAtK(Seq.empty, Set("a"), 5) === 0.0)
  }

  test("a late hit scores lower MAP than an early hit, at equal P@k") {
    val early = Metrics.mapAtK(Seq("a", "x", "y"), Set("a"), 3)
    val late = Metrics.mapAtK(Seq("x", "y", "a"), Set("a"), 3)
    assert(early > late)
    assert(Metrics.precisionAtK(Seq("a", "x", "y"), Set("a"), 3) ===
           Metrics.precisionAtK(Seq("x", "y", "a"), Set("a"), 3))
  }

  test("k must be positive") {
    assertThrows[IllegalArgumentException] { Metrics.precisionAtK(Seq("a"), Set("a"), 0) }
    assertThrows[IllegalArgumentException] { Metrics.recallAtK(Seq("a"), Set("a"), -1) }
    assertThrows[IllegalArgumentException] { Metrics.mapAtK(Seq("a"), Set("a"), 0) }
  }

  test("empty relevant set gives zero recall, not NaN") {
    assert(Metrics.recallAtK(Seq("a"), Set.empty, 3) === 0.0)
  }

  test("mean of empty is 0; mean of values is the average") {
    assert(Metrics.mean(Seq.empty) === 0.0)
    assert(Metrics.mean(Seq(1.0, 2.0, 3.0)) === 2.0)
  }

  test("percentile: endpoints and interpolation") {
    val xs = Seq(10.0, 20.0, 30.0, 40.0, 50.0)
    assert(Metrics.percentile(xs, 0.0) === 10.0)
    assert(Metrics.percentile(xs, 1.0) === 50.0)
    assert(Metrics.percentile(xs, 0.5) === 30.0)
    assert(math.abs(Metrics.percentile(xs, 0.1) - 14.0) < 1e-9)
    assert(math.abs(Metrics.percentile(xs, 0.9) - 46.0) < 1e-9)
  }

  test("percentile is order-insensitive") {
    assert(Metrics.percentile(Seq(50.0, 10.0, 30.0), 0.5) === 30.0)
  }

  test("percentile rejects empty samples and out-of-range p") {
    assertThrows[IllegalArgumentException] { Metrics.percentile(Seq.empty, 0.5) }
    assertThrows[IllegalArgumentException] { Metrics.percentile(Seq(1.0), 1.5) }
  }

  // ----------------------------------------------------------- property tests

  private val universe = (1 to 30).map(i => s"t$i")
  private val rankedGen: Gen[List[String]] =
    Gen.listOf(Gen.oneOf(universe)).map(_.distinct)
  private val relevantGen: Gen[Set[String]] =
    Gen.someOf(universe).map(_.toSet)
  private val kGen: Gen[Int] = Gen.choose(1, 25)

  test("property: all metrics lie in [0, 1]") {
    check(Prop.forAll(rankedGen, relevantGen, kGen) { (ranked, relevant, k) =>
      val p = Metrics.precisionAtK(ranked, relevant, k)
      val r = Metrics.recallAtK(ranked, relevant, k)
      val m = Metrics.mapAtK(ranked, relevant, k)
      p >= 0 && p <= 1 && r >= 0 && r <= 1 && m >= 0 && m <= 1
    })
  }

  test("property: recall is monotone non-decreasing in k") {
    check(Prop.forAll(rankedGen, relevantGen, kGen) { (ranked, relevant, k) =>
      k <= 1 || Metrics.recallAtK(ranked, relevant, k) >=
                Metrics.recallAtK(ranked, relevant, k - 1)
    })
  }

  test("property: recall never exceeds the ideal recall") {
    check(Prop.forAll(rankedGen, relevantGen, kGen) { (ranked, relevant, k) =>
      relevant.isEmpty || Metrics.recallAtK(ranked, relevant, k) <=
                          Metrics.idealRecallAtK(relevant.size, k) + 1e-12
    })
  }

  test("property: P@k * k = R@k * |T_Q|") {
    check(Prop.forAll(rankedGen, relevantGen, kGen) { (ranked, relevant, k) =>
      relevant.isEmpty ||
        math.abs(Metrics.precisionAtK(ranked, relevant, k) * k -
                 Metrics.recallAtK(ranked, relevant, k) * relevant.size) < 1e-9
    })
  }

  test("property: with all hits at the front, MAP@k >= P@k") {
    check(Prop.forAll(relevantGen, kGen) { (relevant, k) =>
      relevant.isEmpty || {
        val ranked = relevant.toSeq.sorted ++ Seq("zz1", "zz2")
        Metrics.mapAtK(ranked, relevant, k) >=
          Metrics.precisionAtK(ranked, relevant, k) - 1e-12
      }
    })
  }

  test("property: duplicating misses after rank k never changes metrics") {
    check(Prop.forAll(rankedGen, relevantGen, kGen) { (ranked, relevant, k) =>
      val padded = ranked ++ Seq.fill(5)("padding-miss")
      Metrics.precisionAtK(ranked.take(k), relevant, k) ==
        Metrics.precisionAtK(padded.take(k), relevant, k) ||
        ranked.size < k // padding inside the top-k window may add misses
    })
  }
}
