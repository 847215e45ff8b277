"""§6.4 Wikipedia-style web indexing.

The paper's 34-stage indexing script mixes POSIX/GNU commands with
foreign-language stages (JavaScript url-extraction, Python stemming); ours
uses the same shape with the one-record-annotated ``strip_html``,
``url_extract``, ``word_stem`` and ``trigrams_aux`` commands — the point
being that a single annotation per foreign command suffices (§6.4
take-away). HTML pages are synthetic (DESIGN.md §5).
"""
from __future__ import annotations

from repro.commands.base import ExecEnv

from .inputs import webindex_env

# download -> extract text -> NLP indexing (tokens, stems, trigram index)
SCRIPT = (
    "cat urls.txt | xargs -n 1 curl -s | strip_html "
    '| tr A-Z a-z | tr -cs a-z "\\n" | grep -v "^.$" | grep -v "^$" '
    "| word_stem | trigrams_aux | sort | uniq -c | sort -rn"
)

# a second query over the same corpus: outbound-link frequency
LINKS_SCRIPT = (
    "cat urls.txt | xargs -n 1 curl -s | url_extract | sort | uniq -c | sort -rn | head -n 10"
)


def make_env(scale: float = 1.0) -> ExecEnv:
    return webindex_env(n_pages=max(4, int(3000 * scale)))
