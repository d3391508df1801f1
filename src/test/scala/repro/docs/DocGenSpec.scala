package repro.docs

import org.scalatest.funsuite.AnyFunSuite

class DocGenSpec extends AnyFunSuite {

  private val seed = 42L

  test("rendering is deterministic in (setting, idx, seed)") {
    val a = DocGen.render(Corpora.fda, 3, seed)
    val b = DocGen.render(Corpora.fda, 3, seed)
    assert(a == b)
  }

  test("different documents differ") {
    assert(DocGen.render(Corpora.fda, 0, seed).text != DocGen.render(Corpora.fda, 1, seed).text)
  }

  test("different seeds differ") {
    assert(DocGen.render(Corpora.fda, 0, 1).text != DocGen.render(Corpora.fda, 0, 2).text)
  }

  test("doc ids are unique and prefixed by the setting") {
    val ids = DocGen.corpus(Corpora.enron, 20, seed).map(_.id)
    assert(ids.distinct.size == 20)
    assert(ids.forall(_.startsWith("enron-doc-")))
  }

  test("gold only contains declared attributes") {
    val names = Corpora.nba.attrs.map(_.name).toSet
    DocGen.corpus(Corpora.nba, 10, seed).foreach { d =>
      assert(d.gold.keySet.subsetOf(names))
    }
  }

  test("attribute coverage rates are honored approximately") {
    val docs = DocGen.corpus(Corpora.enron, 300, seed)
    val bcc  = docs.count(_.gold.contains("bcc")) / 300.0
    val from = docs.count(_.gold.contains("from")) / 300.0
    assert(bcc > 0.2 && bcc < 0.4, s"bcc coverage $bcc (spec 0.3)")
    assert(from == 1.0, s"from coverage $from (spec 1.0)")
  }

  test("variant weights are honored approximately") {
    // FDA '510(k) number': KeyColon 0.70 / upper 0.15 / inline 0.15
    val docs = DocGen.corpus(Corpora.fda, 400, seed).filter(_.variantIdx.contains("510(k) number"))
    val v0   = docs.count(_.variantIdx("510(k) number") == 0).toDouble / docs.size
    assert(v0 > 0.6 && v0 < 0.8, s"variant-0 share $v0")
  }

  test("every present attribute's rendered form parses back to the gold value") {
    for (setting <- Seq(Corpora.fda, Corpora.enron, Corpora.nba, Corpora.movieSites.head, Corpora.uniSites.head)) {
      DocGen.corpus(setting, 15, seed).foreach { d =>
        val parsed = DocParser.parse(setting, d.text).map(f => f.attr -> f.value).toMap
        d.gold.foreach { case (attr, value) =>
          assert(parsed.contains(attr), s"${setting.name}: '$attr' not parsed back")
          val norm = (s: String) => s.replaceAll("\\s+", " ").trim
          assert(norm(parsed(attr)) == norm(value),
            s"${setting.name}/$attr: parsed '${parsed(attr)}' vs gold '$value'")
        }
      }
    }
  }

  test("parser reports no attributes absent from the document") {
    DocGen.corpus(Corpora.enron, 25, seed).foreach { d =>
      val parsed = DocParser.parse(Corpora.enron, d.text).map(_.attr).toSet
      assert(parsed == d.gold.keySet)
    }
  }

  test("parser offsets point at the field position") {
    val d = DocGen.render(Corpora.fda, 0, seed)
    DocParser.parse(Corpora.fda, d.text).foreach { f =>
      assert(f.offset >= 0 && f.offset < d.text.length)
    }
  }

  test("HTML settings render a head and body") {
    val d = DocGen.render(Corpora.nba, 0, seed)
    assert(d.text.startsWith("<html>"))
    assert(d.text.contains("<head>") && d.text.contains("<body>"))
    assert(d.text.endsWith("</html>"))
  }

  test("HTML row fields are wrapped in an infobox table") {
    val d = DocGen.render(Corpora.nba, 1, seed)
    assert(d.text.contains("<table class=\"infobox\">"))
  }

  test("TXT settings contain no HTML") {
    val d = DocGen.render(Corpora.fda, 2, seed)
    assert(!d.text.contains("<html>"))
  }

  test("documents are multi-chunk where the paper's settings are long") {
    val fda   = DocGen.render(Corpora.fda, 0, seed).text.length
    val nba   = DocGen.render(Corpora.nba, 0, seed).text.length
    val enron = DocGen.render(Corpora.enron, 0, seed).text.length
    assert(fda > 2 * 2400, s"FDA docs should span >2 chunks, got $fda chars")
    assert(nba > fda, "NBA pages are the longest in the paper's cost table")
    assert(enron < 2400, "Enron emails fit in one chunk")
  }

  test("filler paragraphs are deterministic and non-empty") {
    val f1 = Filler.paragraph(repro.util.Rng(1), 50)
    val f2 = Filler.paragraph(repro.util.Rng(1), 50)
    assert(f1 == f2 && f1.split("\\s+").length >= 45)
  }

  test("filler never collides with any attribute label") {
    val labels = Corpora.all.flatMap(_.attrs.flatMap(_.variants.flatMap(_._1.labelText))).distinct
    val filler = (0 until 50).map(i => Filler.paragraph(repro.util.Rng(i.toLong), 100)).mkString(" ")
    labels.foreach(l => assert(!filler.contains(l + ":"), s"filler collides with '$l'"))
  }
}
