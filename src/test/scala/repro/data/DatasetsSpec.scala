package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.baseline.EliasFanoCodec

class DatasetsSpec extends AnyFunSuite {

  test("registry has the paper's nine integer datasets") {
    val names = Datasets.integerDatasets(scaleDiv = 2000, minN = 1000).map(_.name)
    assert(names == Seq("linear", "normal", "poisson", "ml", "booksale",
                        "facebook", "wiki", "movieid", "house_price"))
  }

  test("generators are deterministic in (n, seed)") {
    assert(Datasets.linear(1000).sameElements(Datasets.linear(1000)))
    assert(Datasets.movieid(1000).sameElements(Datasets.movieid(1000)))
    assert(Datasets.emails(100).sameElements(Datasets.emails(100)))
  }

  for (ds <- Datasets.integerDatasets(scaleDiv = 2000, minN = 2000)) {
    test(s"${ds.name}: fullySorted flag matches the data") {
      assert(EliasFanoCodec.isSorted(ds.values) == ds.fullySorted)
    }
    test(s"${ds.name}: values fit the declared raw width") {
      if (ds.rawBytesPerValue == 4)
        assert(ds.values.forall(v => v >= Int.MinValue && v <= Int.MaxValue))
    }
  }

  test("poisson and movieid are NOT fully sorted (Elias-Fano inapplicable)") {
    val m = Datasets.integerDatasets(2000, 2000).map(d => d.name -> d.fullySorted).toMap
    assert(!m("poisson") && !m("movieid"))
  }

  test("poisson is mostly sorted (local jitter only)") {
    val v = Datasets.poisson(10000)
    val inversions = (1 until v.length).count(i => v(i) < v(i - 1))
    assert(inversions > 0 && inversions < v.length / 4)
  }

  test("house_price has long runs of repeated values") {
    val v = Datasets.housePrice(10000)
    val repeats = (1 until v.length).count(i => v(i) == v(i - 1))
    assert(repeats > v.length / 10, s"only $repeats repeats")
  }

  test("movieid is piecewise increasing (sawtooth)") {
    val v = Datasets.movieid(10000)
    val increases = (1 until v.length).count(i => v(i) >= v(i - 1))
    assert(increases > v.length * 9 / 10)
    assert(v.max <= 131_000)
  }

  test("facebook has rare large gaps (cluster structure)") {
    val v = Datasets.facebook(20000)
    val gaps = (1 until v.length).map(i => v(i) - v(i - 1))
    val big = gaps.count(_ > 1_000_000)
    assert(big > 0 && big < v.length / 100)
  }

  test("string datasets are sorted and non-empty") {
    for (sd <- Datasets.stringDatasets(10)) {
      assert(sd.values.nonEmpty, sd.name)
      assert(sd.values.sameElements(sd.values.sorted), s"${sd.name} not sorted")
    }
  }

  test("words average close to the paper's ~9 characters") {
    val w = Datasets.words(5000)
    val avg = w.map(_.length).sum.toDouble / w.length
    assert(avg > 6 && avg < 13, s"avg $avg")
  }

  test("emails have host-reversed structure with shared prefixes") {
    val e = Datasets.emails(1000)
    assert(e.forall(s => s.startsWith("com.") || s.startsWith("org.") || s.startsWith("net.")))
  }

  test("medicare domain is sorted, unique, near-arithmetic") {
    val (probe, domain) = Datasets.medicare(1000, 10_000)
    assert(EliasFanoCodec.isSorted(domain))
    assert(domain.distinct.length == domain.length)
    assert(probe.forall(domain.contains))
    val diffs = (1 until domain.length).map(i => domain(i) - domain(i - 1))
    assert(diffs.forall(d => d >= 96 && d <= 104))
  }

  test("medicare probe is skewed toward low ranks") {
    val (probe, domain) = Datasets.medicare(20_000, 10_000)
    val loHalf = probe.count(_ <= domain(domain.length / 2))
    assert(loHalf > probe.length * 6 / 10, s"$loHalf of ${probe.length}")
  }

  test("scaleDiv shrinks the datasets proportionally") {
    val big   = Datasets.integerDatasets(scaleDiv = 1000, minN = 100).find(_.name == "linear").get
    val small = Datasets.integerDatasets(scaleDiv = 2000, minN = 100).find(_.name == "linear").get
    assert(big.values.length == 2 * small.values.length)
  }
}
