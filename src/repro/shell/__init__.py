"""POSIX-shell frontend substrate.

PaSh consumes scripts through libdash (a POSIX shell parser). This package
reimplements the subset of the grammar PaSh's benchmarks exercise: simple
commands, pipelines (``|``), lists (``;``, newline, ``&``), logical operators
(``&&``/``||``), ``for`` loops, subshells, redirections, process substitution
``<(...)``, quoting, ``$var`` expansion and ``{a..b}`` brace ranges.
"""
from .ast import (
    AndOr,
    ForLoop,
    Pipeline,
    ProcSub,
    Redirect,
    Script,
    SimpleCommand,
    Subshell,
    Word,
)
from .lexer import Token, tokenize
from .parser import parse
from .expand import expand_word, brace_expand

__all__ = [
    "AndOr", "ForLoop", "Pipeline", "ProcSub", "Redirect", "Script",
    "SimpleCommand", "Subshell", "Word", "Token", "tokenize", "parse",
    "expand_word", "brace_expand",
]
