package repro.llm

import org.scalatest.funsuite.AnyFunSuite

class PromptsSpec extends AnyFunSuite {

  test("open prompt carries the paper's placeholders and no data-lake customization") {
    assert(Prompts.openTemplate.contains("{{chunk}}"))
    assert(Prompts.openTemplate.contains("{{topic}}"))
    assert(Prompts.openTemplate.contains("List all relevant attributes"))
  }

  test("closed prompt asks for a named attribute") {
    assert(Prompts.closedTemplate.contains("{{attribute}}"))
    assert(Prompts.closedTemplate.contains("{{chunk}}"))
  }

  test("P_A is the zero-shot regex-flavored prompt") {
    assert(Prompts.synthesisA.contains("import re"))
    assert(!Prompts.synthesisA.contains("BeautifulSoup"))
  }

  test("P_B carries the paper's two in-context demonstrations") {
    assert(Prompts.synthesisB.contains("get_dates_modified_field"))
    assert(Prompts.synthesisB.contains("get_date_published_field"))
    assert(Prompts.synthesisB.contains("BeautifulSoup"))
  }

  test("P_B is the more expensive prompt (it ships demonstrations)") {
    assert(Prompts.synthBTokens > Prompts.synthATokens)
  }

  test("validation prompt matches Appendix E.4's yes/no format") {
    assert(Prompts.validateTemplate.contains("Answer: Yes"))
    assert(Prompts.validateTemplate.contains("Answer: No"))
    assert(Prompts.validateTemplate.contains("{{value}}"))
  }

  test("all template token counts are positive") {
    Seq(Prompts.openTokens, Prompts.closedTokens, Prompts.synthATokens,
      Prompts.synthBTokens, Prompts.validateTokens, Prompts.rerankTokens)
      .foreach(t => assert(t > 0))
  }
}
