package repro.keys

import repro.SparkSpec
import repro.core.Bytes

class KeySynthSpec extends SparkSpec {

  private lazy val email = KeySynth.collectKeys(KeySynth.emails(spark, 3000))
  private lazy val wikiK = KeySynth.collectKeys(KeySynth.wiki(spark, 3000))
  private lazy val urlK  = KeySynth.collectKeys(KeySynth.urls(spark, 3000))

  test("emails: non-empty, distinct, deterministic") {
    assert(email.nonEmpty)
    val again = KeySynth.collectKeys(KeySynth.emails(spark, 3000))
    assert(email.map(Bytes.str).sorted.toSeq == again.map(Bytes.str).sorted.toSeq)
  }

  test("emails: host-reversed shape with @") {
    assert(email.forall(k => Bytes.str(k).contains("@")))
    assert(email.count(k => Bytes.str(k).startsWith("com.")) > email.length / 2)
  }

  test("emails: average length in the paper's ballpark (22 ± 8 bytes)") {
    val avg = email.map(_.length).sum.toDouble / email.length
    assert(avg > 14 && avg < 30, s"avg=$avg")
  }

  test("emails: skewed domains (gmail dominates)") {
    val gmail = email.count(k => Bytes.str(k).startsWith("com.gmail"))
    assert(gmail > email.length / 10, s"gmail=$gmail of ${email.length}")
  }

  test("emails: printable ASCII, NUL-free") {
    assert(email.forall(_.forall(b => b >= 33 && b < 127)))
  }

  test("wiki: shape and length") {
    assert(wikiK.forall(k => Bytes.str(k).contains("_")))
    val avg = wikiK.map(_.length).sum.toDouble / wikiK.length
    assert(avg > 10 && avg < 35, s"avg=$avg")
    assert(wikiK.forall(_.forall(b => b >= 33 && b < 127)))
  }

  test("wiki: first letter capitalized") {
    assert(wikiK.forall(k => Character.isUpperCase(Bytes.str(k).charAt(0))))
  }

  test("urls: long keys with long shared prefixes") {
    val avg = urlK.map(_.length).sum.toDouble / urlK.length
    assert(avg > 70 && avg < 140, s"avg=$avg")
    assert(urlK.forall(k => Bytes.str(k).startsWith("http://")))
    assert(urlK.forall(_.forall(b => b >= 33 && b < 127)))
  }

  test("urls: shared-prefix mass exceeds email's (dataset ordering the paper relies on)") {
    def avgLcp(keys: Array[Array[Byte]]): Double = {
      val sorted = keys.sortWith(Bytes.compare(_, _) < 0)
      (1 until sorted.length).map(i => Bytes.lcp(sorted(i - 1), sorted(i))).sum.toDouble /
        (sorted.length - 1)
    }
    assert(avgLcp(urlK) > avgLcp(email))
  }

  test("emailsSplit partitions into gmail+yahoo vs the rest") {
    val (a, b) = KeySynth.emailsSplit(spark, 2000)
    val ka = KeySynth.collectKeys(a); val kb = KeySynth.collectKeys(b)
    assert(ka.nonEmpty && kb.nonEmpty)
    assert(ka.forall { k =>
      val s = Bytes.str(k); s.startsWith("com.gmail") || s.startsWith("com.yahoo")
    })
    assert(kb.forall { k =>
      val s = Bytes.str(k); !s.startsWith("com.gmail") && !s.startsWith("com.yahoo")
    })
  }

  test("dataset() dispatches and rejects unknown names") {
    assert(KeySynth.dataset(spark, "email", 100).columns.sameElements(Array("k")))
    intercept[IllegalArgumentException](KeySynth.dataset(spark, "nope", 1))
  }

  test("Zipf: rank 0 is the hottest and the distribution is skewed") {
    val z = new Zipf(1000, seed = 5)
    val draws = z.draw(20000)
    assert(draws.forall(r => r >= 0 && r < 1000))
    val counts = draws.groupBy(identity).view.mapValues(_.length).toMap
    assert(counts(0) > counts.getOrElse(500, 0))
    assert(counts(0) > draws.length / 50) // hot item gets ≥ 2%
  }

  test("Zipf: deterministic in seed") {
    assert(new Zipf(100, seed = 9).draw(100).toSeq == new Zipf(100, seed = 9).draw(100).toSeq)
  }

  test("KeyShuffle.permutation is a permutation") {
    val p = KeyShuffle.permutation(1000)
    assert(p.sorted.toSeq == (0 until 1000))
  }
}
