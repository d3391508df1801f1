package repro.llm

import repro.util.Tokens

/** The paper's six prompt templates (Appendix E), kept verbatim-in-spirit so
  * that the token costs charged per LLM call are realistic: prompt overhead
  * is the token count of the actual template, and the document chunk is
  * charged on top. None of these is ever customized per data lake — that is
  * the paper's generality claim, and the system code only ever fills the
  * `{{chunk}}` / `{{topic}}` / `{{attribute}}` placeholders.
  */
object Prompts {

  /** E.1 — open extraction: used by Evaporate-Direct on every chunk and by
    * schema synthesis on the sampled chunks.
    */
  val openTemplate: String =
    """Sample text:
      |<div style="text-indent:-0.9em;"><a href="/wiki/Monarchy_of_Canada" title="Monarchy of Canada">Monarch</a></div>
      |<a href="/wiki/Charles_III" title="Charles III">Charles III</a>
      |<div style="text-indent:-0.9em;"><span class="nowrap"><a href="/wiki/Governor_General_of_Canada">Governor General</a></span></div>
      |<a href="/wiki/Mary_Simon" title="Mary Simon">Mary Simon</a>
      |<b>Provinces and Territories</b><ul><li>Saskatchewan</li><li>Manitoba</li><li>Ontario</li><li>Quebec</li>
      |<li>New Brunswick</li><li>Prince Edward Island</li><li>Nova Scotia</li><li>Newfoundland and Labrador</li>
      |<li>Yukon</li><li>Nunavut</li><li>Northwest Territories</li></ul>
      |
      |Question: List all relevant attributes about 'Canada' that are exactly mentioned in this sample text if any.
      |Answer:
      |- Monarch: Charles III
      |- Governor General: Mary Simon
      |- Provinces and Territories: Saskatchewan, Manitoba, Ontario, Quebec, New Brunswick, Prince Edward Island, Nova Scotia, Newfoundland and Labrador, Yukon, Nunavut, Northwest Territories
      |
      |Sample text:
      |Patient birth date: 1990-01-01
      |Prescribed medication: aspirin, ibuprofen, acetaminophen
      |Prescribed dosage: 1 tablet, 2 tablets, 3 tablets
      |Doctor's name: Dr. Burns
      |Date of discharge: 2020-01-01
      |Hospital address: 123 Main Street, New York, NY 10001
      |
      |Question: List all relevant attributes about 'medications' that are exactly mentioned in this sample text if any.
      |Answer:
      |- Prescribed medication: aspirin, ibuprofen, acetaminophen
      |- Prescribed dosage: 1 tablet, 2 tablets, 3 tablets
      |
      |Sample text:
      |{{chunk}}
      |
      |Question: List all relevant attributes about '{{topic}}' that are exactly mentioned in this sample text if any.
      |Answer:""".stripMargin

  /** E.2 — closed attribute extraction: used for the high-quality LLM
    * labels on D_eval (Algorithm 1) and for the ClosedIE task.
    */
  val closedTemplate: String =
    """Here is a sample of text:
      |Patient birth date: 1990-01-01
      |Prescribed medication: aspirin, ibuprofen, acetaminophen
      |Question: What is the "Prescribed medication" field in the text above? Return the exact value.
      |Answer: aspirin, ibuprofen, acetaminophen
      |
      |Here is a sample of text:
      |{{chunk}}
      |Question: What is the "{{attribute}}" field in the text above? Return the exact value.
      |Answer:""".stripMargin

  /** E.3 (P_A) — zero-shot, regex-encouraging function-generation prompt. */
  val synthesisA: String =
    """Here is a sample of text:
      |
      |{{chunk}}
      |
      |Question: Write a python function to extract the entire "{{attribute}}" field from text, but not any other metadata. Return the result as a list.
      |
      |import re
      |def get_{{function_field}}_field(text: str):
      |    \"\"\"Function to extract the "{{attribute}}" field.\"\"\"""".stripMargin

  /** E.3 (P_B) — two in-context demonstrations, any-library function
    * generation prompt.
    */
  val synthesisB: String =
    """Here is a file sample:
      |DESCRIPTION: This file answers the question, "How do I sort a dictionary by value?"
      |DATES MODIFIED: The file was modified on the following dates:
      |2009-03-05T00:49:05
      |2019-04-07T00:22:14
      |2011-11-20T04:21:49
      |USERS: The users who modified the file are:
      |Jeff Jacobs
      |Richard Smith
      |Julia D'Angelo
      |Rebecca Matthews
      |FILE TYPE: This is a text file.
      |Question: Write a python function called "get_dates_modified_field" to extract the "DATES MODIFIED" field from the text. Include any imports.
      |import re
      |def get_dates_modified_field(text: str):
      |    parts = text.split("USERS")[0].split("DATES MODIFIED")[-1]
      |    pattern = r'\d{4}-\d{2}-\d{2}T\d{2}:\d{2}:\d{2}'
      |    return re.findall(pattern, text)
      |
      |Here is a file sample:
      |<title>U.S. GDP Rose 2.9% in the Fourth Quarter After a Year of High Inflation - WSJ</title>
      |<meta property="og:url" content="https://www.wsj.com/articles/us-gdp-economic-growth-fourth-quarter-2022"/>
      |<meta name="article.published" content="2023-01-26T10:30:00Z"/><meta itemProp="datePublished" content="2023-01-26T10:30:00Z"/>
      |Question: Write a python function called "get_date_published_field" to extract the "datePublished" field from the text. Include any imports.
      |from bs4 import BeautifulSoup
      |def get_date_published_field(text: str):
      |    soup = BeautifulSoup(text, parser="html.parser")
      |    date_published_field = soup.find('meta', itemprop="datePublished")
      |    return date_published_field['content']
      |
      |Here is a sample of text:
      |{{chunk}}
      |Question: Write a python function called "get_{{function_field}}_field" to extract the "{{attribute}}" field from the text. Include any imports.""".stripMargin

  /** E.4 — unsupervised attribute validation over sampled values. */
  val validateTemplate: String =
    """Question: Could "2014" be a "year" value in a "students" database?
      |Answer: Yes
      |----
      |Question: Could "cupcake" be a "occupation" value in a "employee" database?
      |Answer: No
      |----
      |Question: Could "" be a "animal" value in a "zoo" database?
      |Answer: No
      |----
      |Question: Could "police officer" be a "occupation" value in a "employee" database?
      |Answer: Yes
      |----
      |Question: Could "{{value}}" be a "{{attribute}}" value in a "{{topic}}" database?
      |Answer:""".stripMargin

  /** The schema re-ranking prompt (§3.2.1): identify the most useful
    * attributes among candidates extracted from the document sample.
    */
  val rerankTemplate: String =
    """Here is a list of attributes extracted from a sample of documents about '{{topic}}':
      |{{attributes}}
      |Question: Which of these attributes are the most useful for building a database about '{{topic}}'?
      |List only attributes that are genuinely informative, one per line.
      |Answer:""".stripMargin

  val openTokens: Long     = Tokens.count(openTemplate)
  val closedTokens: Long   = Tokens.count(closedTemplate)
  val synthATokens: Long   = Tokens.count(synthesisA)
  val synthBTokens: Long   = Tokens.count(synthesisB)
  val validateTokens: Long = Tokens.count(validateTemplate)
  val rerankTokens: Long   = Tokens.count(rerankTemplate)
}
