"""Word expansion: ``$var``, ``{a..b}`` brace ranges, and literal splicing.

PaSh is conservative (§4.1): a word containing a command substitution or an
*unknown* variable is not fully expandable, and the frontend refuses to
parallelize around it. ``expand_word`` mirrors that: it returns ``None`` when
the word cannot be fully resolved against the given environment.
"""
from __future__ import annotations

import re
from typing import Dict, List, Optional

from .ast import Word

_BRACE_RANGE = re.compile(r"\{(-?\d+)\.\.(-?\d+)\}")
_BRACE_LIST = re.compile(r"\{([^{}]*,[^{}]*)\}")


def expand_word(word: Word, env: Dict[str, str]) -> Optional[str]:
    """Expand to a single string, or ``None`` if not fully resolvable."""
    out: List[str] = []
    for kind, payload in word.segments:
        if kind == "lit":
            out.append(payload)
        elif kind == "var":
            if payload not in env:
                return None
            out.append(env[payload])
        else:  # cmdsub / procsub: never statically resolvable here
            return None
    return "".join(out)


def brace_expand(text: str) -> List[str]:
    """Expand ``{a..b}`` numeric ranges and ``{x,y,z}`` lists (one level).

    Returns the list of expansions (a single-element list when there is no
    brace pattern), matching bash's left-to-right product order.
    """
    m = _BRACE_RANGE.search(text)
    if m:
        lo, hi = int(m.group(1)), int(m.group(2))
        step = 1 if hi >= lo else -1
        return [
            e
            for v in range(lo, hi + step, step)
            for e in brace_expand(text[: m.start()] + str(v) + text[m.end() :])
        ]
    m = _BRACE_LIST.search(text)
    if m:
        return [
            e
            for alt in m.group(1).split(",")
            for e in brace_expand(text[: m.start()] + alt + text[m.end() :])
        ]
    return [text]
