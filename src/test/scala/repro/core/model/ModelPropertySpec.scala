package repro.core.model

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

import repro.core.storage.SegmentCodec

/** ScalaCheck property tests for the codecs and the model-type contracts,
  * driven through ScalaCheck's own runner (no scalatestplus bridge in the
  * offline image).
  */
class ModelPropertySpec extends AnyFunSuite {

  private def check(prop: Prop, name: String): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), prop)
    assert(res.passed, s"$name: $res")
  }

  private val floatGen: Gen[Float] = Gen.oneOf(
    Gen.chooseNum(-1e6f, 1e6f),
    Gen.oneOf(0.0f, -0.0f, Float.MinPositiveValue, Float.MaxValue,
              Float.PositiveInfinity, Float.NegativeInfinity),
  )

  test("property: Gorilla roundtrips arbitrary float sequences") {
    val prop = Prop.forAll(Gen.nonEmptyListOf(floatGen)) { values =>
      val f = Gorilla.newFitter(1, 0.0, values.length)
      values.foreach(v => f.append(Array(v)))
      val dec = Gorilla.decode(f.serialize(), 1, values.length)
      values.zipWithIndex.forall { case (v, i) =>
        java.lang.Float.floatToRawIntBits(dec(i)) == java.lang.Float.floatToRawIntBits(v)
      }
    }
    check(prop, "gorilla roundtrip")
  }

  test("property: Gorilla group roundtrips arbitrary groups") {
    val groupGen = for {
      n     <- Gen.choose(1, 6)
      ticks <- Gen.choose(1, 40)
      rows  <- Gen.listOfN(ticks, Gen.listOfN(n, floatGen))
    } yield (n, rows)
    val prop = Prop.forAll(groupGen) { case (n, rows) =>
      val f = Gorilla.newFitter(n, 0.0, rows.length)
      rows.foreach(r => f.append(r.toArray))
      val dec = Gorilla.decode(f.serialize(), n, rows.length)
      rows.zipWithIndex.forall { case (r, t) =>
        r.zipWithIndex.forall { case (v, s) =>
          java.lang.Float.floatToRawIntBits(dec(t * n + s)) == java.lang.Float.floatToRawIntBits(v)
        }
      }
    }
    check(prop, "gorilla group roundtrip")
  }

  test("property: PMC-Mean never violates the relative bound") {
    val seqGen = for {
      eps    <- Gen.oneOf(0.0, 1.0, 5.0, 10.0, 25.0)
      base   <- Gen.chooseNum(1.0f, 1000.0f)
      values <- Gen.nonEmptyListOf(Gen.chooseNum(-0.2f, 0.2f).map(d => base * (1 + d)))
    } yield (eps, values)
    val prop = Prop.forAll(seqGen) { case (eps, values) =>
      val f = PmcMean.newFitter(1, eps, 10000)
      val accepted = values.iterator.takeWhile(v => f.append(Array(v))).toList
      accepted.isEmpty || {
        val m = PmcMean.decode(f.serialize(), 1, accepted.length)(0)
        accepted.forall(v => math.abs(v - m) <= eps / 100.0 * math.abs(v) + 1e-5)
      }
    }
    check(prop, "pmc bound")
  }

  test("property: Swing never violates the relative bound") {
    val seqGen = for {
      eps   <- Gen.oneOf(1.0, 5.0, 10.0)
      base  <- Gen.chooseNum(10.0f, 1000.0f)
      slope <- Gen.chooseNum(-1.0f, 1.0f)
      n     <- Gen.choose(2, 200)
      noise <- Gen.listOfN(n, Gen.chooseNum(-0.01f, 0.01f))
    } yield (eps, noise.zipWithIndex.map { case (d, i) => base + slope * i + base * d })
    val prop = Prop.forAll(seqGen) { case (eps, values) =>
      val f = Swing.newFitter(1, eps, 10000)
      val accepted = values.iterator.takeWhile(v => f.append(Array(v))).toList
      accepted.length < 1 || {
        val dec = Swing.decode(f.serialize(), 1, accepted.length)
        accepted.zipWithIndex.forall { case (v, t) =>
          math.abs(v - dec(t)) <= eps / 100.0 * math.abs(v) + 1e-4
        }
      }
    }
    check(prop, "swing bound")
  }

  test("property: segment codec varints roundtrip") {
    val prop = Prop.forAll(Gen.chooseNum(Long.MinValue + 1, Long.MaxValue)) { v =>
      SegmentCodec.unzigzag(SegmentCodec.zigzag(v)) == v
    }
    check(prop, "zigzag roundtrip")
  }

  test("property: bit buffer roundtrips arbitrary (width, value) sequences") {
    val pairGen = for {
      w <- Gen.choose(1, 64)
      v <- Gen.chooseNum(Long.MinValue, Long.MaxValue)
    } yield (w, if (w == 64) v else v & ((1L << w) - 1))
    val prop = Prop.forAll(Gen.nonEmptyListOf(pairGen)) { pairs =>
      val wr = new BitWriter()
      pairs.foreach { case (w, v) => wr.writeBits(v, w) }
      val rd = new BitReader(wr.toBytes)
      pairs.forall { case (w, v) => rd.readBits(w) == v }
    }
    check(prop, "bit buffer roundtrip")
  }

  test("property: aggregate default equals decode accumulation for every type") {
    val gen = for {
      mid   <- Gen.oneOf(1, 2, 3, 4)
      n     <- Gen.choose(1, 4)
      ticks <- Gen.choose(2, 30)
    } yield (ModelType.byMid(mid), n, ticks)
    val prop = Prop.forAll(gen) { case (mt, n, ticks) =>
      val f = mt.newFitter(n, 50.0, ticks)
      val v = Array.fill(n)(100.0f)
      val ok = (0 until ticks).forall(_ => f.append(v))
      !ok || {
        val p   = f.serialize()
        val agg = mt.aggregate(p, n, ticks, 0, ticks - 1)
        val dec = mt.decode(p, n, ticks)
        (0 until n).forall { s =>
          val col = (0 until ticks).map(t => dec(t * n + s).toDouble)
          agg(s).count == ticks &&
            math.abs(agg(s).sum - col.sum) < 1e-6 &&
            agg(s).min == col.min && agg(s).max == col.max
        }
      }
    }
    check(prop, "aggregate consistency")
  }
}
