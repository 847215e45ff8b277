"""Recursive-descent parser producing the AST of :mod:`repro.shell.ast`.

Grammar (the subset PaSh's benchmarks exercise)::

    script   := list EOF
    list     := and_or ((';' | '&' | NEWLINE)+ and_or)*
    and_or   := pipeline (('&&' | '||') pipeline)*
    pipeline := command ('|' command)*
    command  := 'for' NAME 'in' word* sep 'do' list 'done'
              | '(' list ')'
              | assign* word+ redirect*
              | assign+
    redirect := ('<' | '>' | '>>') word
"""
from __future__ import annotations

from typing import List, Optional, Tuple

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


class ParseError(ValueError):
    pass


class _Parser:
    def __init__(self, tokens: List[Token]):
        self.toks = tokens
        self.pos = 0

    # -- token helpers -----------------------------------------------------
    def peek(self) -> Token:
        return self.toks[self.pos]

    def next(self) -> Token:
        t = self.toks[self.pos]
        self.pos += 1
        return t

    def at_word(self, text: Optional[str] = None) -> bool:
        t = self.peek()
        if t.kind != "WORD":
            return False
        if text is None:
            return True
        w: Word = t.value
        return w.is_literal() and w.literal_text() == text

    def expect_word(self, text: str) -> None:
        if not self.at_word(text):
            raise ParseError(f"expected {text!r}, got {self.peek()}")
        self.next()

    def skip_newlines(self) -> None:
        while self.peek().kind == "NEWLINE":
            self.next()

    # -- grammar -----------------------------------------------------------
    def parse_script(self, *, stop: Tuple[str, ...] = ()) -> Script:
        items, bg = [], []
        self.skip_newlines()
        while True:
            t = self.peek()
            if t.kind == "EOF" or t.is_op(")") or (
                t.kind == "WORD" and self.at_word() and any(self.at_word(s) for s in stop)
            ):
                break
            node = self.parse_and_or()
            background = False
            while self.peek().kind == "NEWLINE" or self.peek().is_op(";", "&"):
                if self.peek().is_op("&"):
                    background = True
                self.next()
                self.skip_newlines()
            items.append(node)
            bg.append(background)
        return Script(tuple(items), tuple(bg))

    def parse_and_or(self):
        parts = [self.parse_pipeline()]
        ops: List[str] = []
        while self.peek().is_op("&&", "||"):
            ops.append(self.next().value)
            self.skip_newlines()
            parts.append(self.parse_pipeline())
        if not ops:
            return parts[0]
        return AndOr(tuple(parts), tuple(ops))

    def parse_pipeline(self) -> Pipeline:
        cmds = [self.parse_command()]
        while self.peek().is_op("|"):
            self.next()
            self.skip_newlines()
            cmds.append(self.parse_command())
        return Pipeline(tuple(cmds))

    def parse_command(self):
        if self.at_word("for"):
            return self.parse_for()
        if self.peek().is_op("("):
            self.next()
            body = self.parse_script()
            if not self.peek().is_op(")"):
                raise ParseError("expected ) to close subshell")
            self.next()
            return Subshell(body)
        return self.parse_simple()

    def parse_for(self) -> ForLoop:
        self.expect_word("for")
        var_tok = self.next()
        if var_tok.kind != "WORD" or not var_tok.value.is_literal():
            raise ParseError("for: expected variable name")
        var = var_tok.value.literal_text()
        self.expect_word("in")
        items: List[Word] = []
        while self.at_word() and not any(self.at_word(k) for k in ("do",)):
            items.append(self.parse_argument())
        while self.peek().kind == "NEWLINE" or self.peek().is_op(";"):
            self.next()
        self.expect_word("do")
        self.skip_newlines()
        body = self.parse_script(stop=("done",))
        self.expect_word("done")
        return ForLoop(var, tuple(items), body)

    def parse_argument(self) -> Word:
        """A word, possibly a ``<(...)`` process substitution."""
        if self.peek().is_op("<("):
            self.next()
            body = self.parse_script()
            if not self.peek().is_op(")"):
                raise ParseError("expected ) to close <(")
            self.next()
            return Word((("procsub", ProcSub(body)),))
        t = self.next()
        if t.kind != "WORD":
            raise ParseError(f"expected word, got {t}")
        return t.value

    def parse_simple(self) -> SimpleCommand:
        assigns: List[Tuple[str, Word]] = []
        words: List[Word] = []
        redirects: List[Redirect] = []
        # leading assignments: NAME=value before the command name
        while self.at_word() and not words:
            w: Word = self.peek().value
            k0, p0 = w.segments[0]
            if k0 == "lit" and p0 and "=" in p0 and p0.split("=", 1)[0].isidentifier():
                name, rest = p0.split("=", 1)
                self.next()
                val = Word((("lit", rest),) + w.segments[1:])
                assigns.append((name, val))
            else:
                break
        while True:
            t = self.peek()
            if t.kind == "WORD" or t.is_op("<("):
                words.append(self.parse_argument())
            elif t.is_op("<", ">", ">>"):
                op = self.next().value
                redirects.append(Redirect(op, self.parse_argument()))
            else:
                break
        if not words and not assigns:
            raise ParseError(f"expected command, got {self.peek()}")
        return SimpleCommand(tuple(assigns), tuple(words), tuple(redirects))


def parse(src: str) -> Script:
    """Parse shell source into a :class:`Script` AST."""
    p = _Parser(tokenize(src))
    script = p.parse_script()
    if p.peek().kind != "EOF":
        raise ParseError(f"trailing input at {p.peek()}")
    return script
