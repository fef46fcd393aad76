package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

class DBSCANSpec extends AnyFunSuite {

  /** Run a scalacheck property under scalatest (scalatestplus bridge is
    * not in the offline dependency set).
    */
  private def check(p: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(50), p)
    assert(res.passed, res.status.toString)
  }

  private def pts(xs: Double*): IndexedSeq[Array[Double]] =
    xs.map(x => Array(x)).toIndexedSeq

  test("empty input yields empty labels") {
    assert(DBSCAN.fit(IndexedSeq.empty, 1.0, 2).isEmpty)
  }

  test("single point below minPts is noise") {
    assert(DBSCAN.fit(pts(1.0), 1.0, 2).toSeq == Seq(DBSCAN.Noise))
  }

  test("single point with minPts=1 is its own cluster") {
    assert(DBSCAN.fit(pts(1.0), 1.0, 1).toSeq == Seq(0))
  }

  test("one dense 1-D cluster, no noise") {
    val labels = DBSCAN.fit(pts(0, 1, 2, 3, 4), 1.5, 3)
    assert(labels.toSet == Set(0))
  }

  test("two separated clusters get distinct labels") {
    val labels = DBSCAN.fit(pts(0, 1, 2, 100, 101, 102), 1.5, 3)
    assert(labels.take(3).toSet.size == 1)
    assert(labels.drop(3).toSet.size == 1)
    assert(labels(0) != labels(3))
  }

  test("isolated point between clusters is noise") {
    val labels = DBSCAN.fit(pts(0, 1, 2, 50, 100, 101, 102), 1.5, 3)
    assert(labels(3) == DBSCAN.Noise)
  }

  test("border point joins the cluster of its core neighbour") {
    // 0,1,2 dense; 3 is within eps of 2 but has only 2 neighbours itself.
    val labels = DBSCAN.fit(pts(0, 1, 2, 3.4), 1.5, 3)
    assert(labels(3) == labels(2))
  }

  test("the paper's Query 4 scenario: benign IP sums cluster, exfil is noise") {
    // Ten benign per-IP window sums near 20k; one exfiltration sum at 6M.
    val benign = (0 until 10).map(i => 18000.0 + i * 600)
    val labels = DBSCAN.fit(pts(benign :+ 6.0e6: _*), 100000.0, 5)
    assert(labels.take(10).toSet.size == 1 && labels.take(10).head != DBSCAN.Noise)
    assert(labels.last == DBSCAN.Noise)
  }

  test("outliers() flags exactly the noise points") {
    val o = DBSCAN.outliers(pts(0, 1, 2, 50), 1.5, 3)
    assert(o.toSeq == Seq(false, false, false, true))
  }

  test("2-D euclidean distance") {
    assert(DBSCAN.euclidean(Array(0.0, 0.0), Array(3.0, 4.0)) == 5.0)
  }

  test("dimension mismatch is rejected") {
    intercept[IllegalArgumentException](
      DBSCAN.euclidean(Array(1.0), Array(1.0, 2.0)))
  }

  test("invalid eps / minPts rejected") {
    intercept[IllegalArgumentException](DBSCAN.fit(pts(1), 0.0, 1))
    intercept[IllegalArgumentException](DBSCAN.fit(pts(1), 1.0, 0))
  }

  test("2-D clusters separate") {
    val a = Seq(Array(0.0, 0.0), Array(0.5, 0.5), Array(0.0, 0.5))
    val b = Seq(Array(10.0, 10.0), Array(10.5, 10.0), Array(10.0, 10.5))
    val labels = DBSCAN.fit((a ++ b).toIndexedSeq, 1.0, 3)
    assert(labels.take(3).toSet.size == 1 && labels.drop(3).toSet.size == 1)
    assert(labels(0) != labels(3))
  }

  test("property: labels length matches input; labels are Noise or in [0, n)") {
    check(Prop.forAll(Gen.listOf(Gen.choose(0.0, 100.0))) { xs =>
      val labels = DBSCAN.fit(xs.map(x => Array(x)).toIndexedSeq, 5.0, 3)
      labels.length == xs.size &&
        labels.forall(l => l == DBSCAN.Noise || (l >= 0 && l < xs.size))
    })
  }

  test("property: with minPts=1 every point is clustered (no noise)") {
    check(Prop.forAll(Gen.nonEmptyListOf(Gen.choose(0.0, 100.0))) { xs =>
      DBSCAN.fit(xs.map(x => Array(x)).toIndexedSeq, 5.0, 1)
        .forall(_ != DBSCAN.Noise)
    })
  }

  test("property: with every point duplicated and minPts=2 nothing is noise") {
    check(Prop.forAll(Gen.listOfN(6, Gen.choose(0.0, 100.0))) { xs =>
      val twice = (xs ++ xs).map(x => Array(x)).toIndexedSeq
      DBSCAN.outliers(twice, 5.0, 2).forall(_ == false)
    })
  }
}
