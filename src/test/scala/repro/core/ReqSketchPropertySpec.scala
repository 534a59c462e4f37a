package repro.core

import org.scalacheck.{Gen, Properties}
import org.scalacheck.Prop.{forAll, propBoolean}

/** Property-based invariants of the REQ sketch over arbitrary small streams
  * and parameters (plain ScalaCheck; sbt runs these alongside scalatest).
  */
object ReqSketchPropertySpec extends Properties("ReqSketch") {

  private val streamGen: Gen[List[Double]] =
    Gen.chooseNum(0, 3000).flatMap(n => Gen.listOfN(n, Gen.chooseNum(-1e6, 1e6)))

  private val epsGen: Gen[Double] = Gen.oneOf(0.05, 0.1, 0.25)

  property("n equals the number of updates") = forAll(streamGen, epsGen) { (xs, eps) =>
    val s = ReqSketch(eps, 0.1, seed = 1)
    xs.foreach(s.update)
    s.n == xs.length
  }

  property("rank is monotone in the query point") = forAll(streamGen, epsGen) { (xs, eps) =>
    xs.nonEmpty ==> {
      val s = ReqSketch(eps, 0.1, seed = 2)
      xs.foreach(s.update)
      val rs = xs.sorted.map(s.rank)
      rs == rs.sorted
    }
  }

  property("rank below min is 0; at max it is totalWeight") =
    forAll(streamGen, epsGen) { (xs, eps) =>
      xs.nonEmpty ==> {
        val s = ReqSketch(eps, 0.1, seed = 3)
        xs.foreach(s.update)
        s.rank(xs.min - 1) == 0 && s.rank(xs.max) == s.totalWeight
      }
    }

  property("total weight within 5% of n") = forAll(streamGen, epsGen) { (xs, eps) =>
    (xs.length >= 100) ==> {
      val s = ReqSketch(eps, 0.1, seed = 4)
      xs.foreach(s.update)
      math.abs(s.totalWeight - s.n) <= math.max(4, 0.05 * s.n)
    }
  }

  property("items stored never exceed stream length") =
    forAll(streamGen, epsGen) { (xs, eps) =>
      val s = ReqSketch(eps, 0.1, seed = 5)
      xs.foreach(s.update)
      s.itemsStored <= math.max(1, xs.length)
    }

  property("merge of a random split preserves n") =
    forAll(streamGen, Gen.chooseNum(0.0, 1.0)) { (xs, frac) =>
      val cut = (xs.length * frac).toInt
      val (l, r) = xs.splitAt(cut)
      val a = ReqSketch(0.1, 0.1, seed = 6); l.foreach(a.update)
      val b = ReqSketch(0.1, 0.1, seed = 7); r.foreach(b.update)
      a.merge(b).n == xs.length
    }

  property("quantile stays within the data range") =
    forAll(streamGen, Gen.chooseNum(0.01, 1.0)) { (xs, phi) =>
      xs.nonEmpty ==> {
        val s = ReqSketch(0.1, 0.1, seed = 8)
        xs.foreach(s.update)
        val q = s.quantile(phi)
        q >= xs.min && q <= xs.max
      }
    }

  property("duplicates keep rank monotone and weight consistent") = {
    val dupGen = Gen.chooseNum(1, 2000).flatMap(n =>
      Gen.listOfN(n, Gen.chooseNum(0, 20).map(_.toDouble)))
    forAll(dupGen) { xs =>
      val s = ReqSketch(0.1, 0.1, seed = 9)
      xs.foreach(s.update)
      val rs = (0 to 21).map(i => s.rank(i.toDouble))
      rs == rs.sorted && s.rank(21.0) == s.totalWeight
    }
  }

  property("streaming equals merge-of-singletons in count") =
    forAll(Gen.listOfN(300, Gen.chooseNum(-1e3, 1e3))) { xs =>
      var acc = ReqSketch(0.25, 0.1, seed = 10)
      xs.zipWithIndex.foreach { case (x, i) =>
        val one = ReqSketch(0.25, 0.1, seed = 11 + i)
        one.update(x)
        acc = acc.merge(one)
      }
      acc.n == xs.length
    }

  property("exact ranks while no compaction has happened") =
    forAll(Gen.listOfN(60, Gen.chooseNum(-1e6, 1e6))) { xs =>
      val distinct = xs.distinct
      val s = ReqSketch(0.05, 0.1, seed = 12)
      distinct.foreach(s.update)
      (s.height > 0 || s.itemsStored < distinct.length) || {
        distinct.sorted.zipWithIndex.forall { case (x, i) => s.rank(x) == i + 1 }
      }
    }
}
