"""The six Appendix-E prompt templates from the Evaporate paper.

The templates are reproduced (lightly abridged) so that the simulated
LLM processes prompts whose *token footprint* matches the real system's
shape: each call pays a fixed template overhead plus the inserted
document chunk. The MockLLM answers from the chunk + its noise profile;
the template text is what gets metered by the token ledger.

Template names map to the paper:
  OPENIE_PROMPT        E.1  end-to-end / schema-identification prompt
  CLOSED_PROMPT        E.2  attribute-value extraction prompt (LLM F)
  FUNC_PROMPT_A        E.3  P_A - no in-context examples, regex style
  FUNC_PROMPT_B        E.3  P_B - two in-context examples, any library
  VALIDATE_PROMPT      E.4  unsupervised schema validation
  RERANK_PROMPT        §3.2.1 attribute re-ranking
"""
from __future__ import annotations

OPENIE_PROMPT = """Sample text:
<div><a href="/wiki/Monarchy_of_Canada" title="Monarchy of Canada">Monarch</a></div>
<td><a href="/wiki/Charles_III" title="Charles III">Charles III</a></td>
<div><a href="/wiki/Governor_General_of_Canada">Governor General</a></div>
<td><a href="/wiki/Mary_Simon" title="Mary Simon">Mary Simon</a></td>
<b>Provinces and Territories</b><ul><li>Saskatchewan</li><li>Manitoba</li>
<li>Ontario</li><li>Quebec</li><li>New Brunswick</li><li>Prince Edward Island</li>
<li>Nova Scotia</li><li>Newfoundland and Labrador</li><li>Yukon</li><li>Nunavut</li>
<li>Northwest Territories</li></ul>

Question: List all relevant attributes about 'Canada' that are exactly mentioned in this sample text if any.
Answer:
- Monarch: Charles III
- Governor General: Mary Simon
- Provinces and Territories: Saskatchewan, Manitoba, Ontario, Quebec, New Brunswick, Prince Edward Island, Nova Scotia, Newfoundland and Labrador, Yukon, Nunavut, Northwest Territories

----

Sample text:
Patient birth date: 1990-01-01
Prescribed medication: aspirin, ibuprofen, acetaminophen
Prescribed dosage: 1 tablet, 2 tablets, 3 tablets
Doctor's name: Dr. Burns
Date of discharge: 2020-01-01
Hospital address: 123 Main Street, New York, NY 10001

Question: List all relevant attributes about 'medications' that are exactly mentioned in this sample text if any.
Answer:
- Prescribed medication: aspirin, ibuprofen, acetaminophen
- Prescribed dosage: 1 tablet, 2 tablets, 3 tablets

----

Sample text:
{chunk}

Question: List all relevant attributes about '{topic}' that are exactly mentioned in this sample text if any.
Answer:"""


CLOSED_PROMPT = """Here is a file sample:
DESCRIPTION: This file answers the question, "How do I sort a dictionary by value?"
DATES MODIFIED: 2009-03-05T00:49:05 2019-04-07T00:22:14
USERS: Jeff Jacobs, Richard Smith
FILE TYPE: This is a text file.

Question: Return the full "DATES MODIFIED" field from the text.
Answer: 2009-03-05T00:49:05 2019-04-07T00:22:14

----

Here is a file sample:
{chunk}

Question: Return the full "{attribute}" field from the text.
Answer:"""


FUNC_PROMPT_A = """Here is a sample of text:

{chunk}

Question: Write a python function to extract the entire "{attribute}" field from text, but not any other metadata. Return the result as a list.

import re
def get_{function_field}_field(text: str):
    \"\"\"Function to extract the {attribute} field.\"\"\"
"""


FUNC_PROMPT_B = """Here is a file sample:
DESCRIPTION: This file answers the question, "How do I sort a dictionary by value?"
DATES MODIFIED: The file was modified on the following dates:
2009-03-05T00:49:05
2019-04-07T00:22:14
USERS: The users who modified the file are:
Jeff Jacobs
Richard Smith

Question: Write a python function called "get_dates_modified_field" to extract the "DATES MODIFIED" field from the text. Include any imports.

import re
def get_dates_modified_field(text: str):
    parts = text.split("USERS")[0].split("DATES MODIFIED")[-1]
    pattern = r'\\d{{4}}-\\d{{2}}-\\d{{2}}T\\d{{2}}:\\d{{2}}:\\d{{2}}'
    return re.findall(pattern, text)

----

Here is a file sample:
<title>U.S. GDP Rose 2.9% in the Fourth Quarter - WSJ</title>
<meta name="article.published" content="2023-01-26T10:30:00Z"/><meta itemProp="datePublished" content="2023-01-26T10:30:00Z"/>

Question: Write a python function called "get_date_published_field" to extract the "datePublished" field from the text. Include any imports.

import re
def get_date_published_field(text: str):
    m = re.search(r'itemProp="datePublished" content="([^"]+)"', text)
    return m.group(1) if m else ""

----

Here is a file sample:
{chunk}

Question: Write a python function called "get_{function_field}_field" to extract the "{attribute}" field from the text. Include any imports.
"""


VALIDATE_PROMPT = """Question: Could "2014" be a "year" value in a "students" database?
Answer: Yes
----
Question: Could "cupcake" be a "occupation" value in a "employee" database?
Answer: No
----
Question: Could "" be a "animal" value in a "zoo" database?
Answer: No
----
Question: Could "police officer" be a "occupation" value in a "employee" database?
Answer: Yes
----
Question: Could "{value}" be a "{attribute}" value in a "{topic}" database?
Answer:"""


RERANK_PROMPT = """Here is a list of attributes extracted from a sample of documents about '{topic}':
{attributes}

Question: Which of these attributes are the most useful for analysis across the document collection? List the most useful attributes.
Answer:"""


def render(template: str, **kw: str) -> str:
    """Fill a prompt template; used for token metering and the MockLLM."""
    return template.format(**kw)
