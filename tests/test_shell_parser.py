"""Shell lexer/parser unit tests."""
import pytest

from repro.shell import (
    AndOr, ForLoop, Pipeline, Script, SimpleCommand, Subshell, Word,
    brace_expand, expand_word, parse, tokenize,
)
from repro.shell.lexer import LexError
from repro.shell.parser import ParseError


def first_pipeline(src):
    s = parse(src)
    assert isinstance(s.items[0], Pipeline)
    return s.items[0]


class TestLexer:
    def test_simple_words(self):
        toks = tokenize("cat file.txt")
        assert [t.kind for t in toks] == ["WORD", "WORD", "EOF"]

    def test_operators(self):
        toks = tokenize("a | b && c ; d & e || f")
        ops = [t.value for t in toks if t.kind == "OP"]
        assert ops == ["|", "&&", ";", "&", "||"]

    def test_single_quotes_literal(self):
        (w,) = [t.value for t in tokenize("'a $b |'") if t.kind == "WORD"]
        assert w.is_literal() and w.literal_text() == "a $b |"

    def test_double_quotes_expand(self):
        (w,) = [t.value for t in tokenize('"x $y z"') if t.kind == "WORD"]
        kinds = [k for k, _ in w.segments]
        assert kinds == ["lit", "var", "lit"]

    def test_var_brace_form(self):
        (w,) = [t.value for t in tokenize("${foo}bar") if t.kind == "WORD"]
        assert w.segments[0] == ("var", "foo")

    def test_attached_quotes(self):
        (a, b) = [t.value for t in tokenize('tr -s" "') if t.kind == "WORD"]
        assert b.literal_text() == "-s "

    def test_cmdsub_opaque(self):
        (w,) = [t.value for t in tokenize("$(date)") if t.kind == "WORD"]
        assert w.segments[0][0] == "cmdsub"

    def test_comment_stripped(self):
        toks = tokenize("a b # comment here\nc")
        words = [t for t in toks if t.kind == "WORD"]
        assert len(words) == 3

    def test_escape(self):
        (w,) = [t.value for t in tokenize(r"a\ b") if t.kind == "WORD"]
        assert w.literal_text() == "a b"

    def test_procsub_token(self):
        toks = tokenize("sort <(cat f)")
        assert any(t.is_op("<(") for t in toks)

    def test_unterminated_quote_raises(self):
        with pytest.raises(LexError):
            tokenize("'oops")

    def test_line_continuation(self):
        toks = tokenize("a \\\n b")
        assert len([t for t in toks if t.kind == "WORD"]) == 2
        assert not any(t.kind == "NEWLINE" for t in toks)


class TestParser:
    def test_pipeline_chain(self):
        p = first_pipeline("a | b | c")
        assert len(p.commands) == 3

    def test_redirects(self):
        p = first_pipeline("sort < in.txt > out.txt")
        cmd = p.commands[0]
        assert {r.op for r in cmd.redirects} == {"<", ">"}

    def test_assignment_only(self):
        p = first_pipeline("x=foo")
        cmd = p.commands[0]
        assert cmd.assigns[0][0] == "x" and not cmd.words

    def test_assignment_then_command(self):
        s = parse("x=1; echo done")
        assert len(s.items) == 2

    def test_andor(self):
        s = parse("a && b || c")
        ao = s.items[0]
        assert isinstance(ao, AndOr) and ao.ops == ("&&", "||")

    def test_background_flag(self):
        s = parse("a &\nb")
        assert s.background == (True, False)

    def test_for_loop(self):
        s = parse("for i in a b c; do echo $i; done")
        loop = s.items[0].commands[0]
        assert isinstance(loop, ForLoop)
        assert loop.var == "i" and len(loop.items) == 3
        assert len(loop.body.items) == 1

    def test_for_loop_multiline(self):
        src = "for y in {1..3}\ndo\n cat f | sort\ndone"
        loop = parse(src).items[0].commands[0]
        assert isinstance(loop, ForLoop)

    def test_subshell(self):
        s = parse("(a | b) | c")
        p = s.items[0]
        assert isinstance(p.commands[0], Subshell)

    def test_procsub_argument(self):
        p = first_pipeline("comm -23 <(sort a) <(sort b)")
        cmd = p.commands[0]
        assert sum(1 for w in cmd.words if w.has_procsub()) == 2

    def test_empty_command_raises(self):
        with pytest.raises(ParseError):
            parse("a | | b")

    def test_newline_separates(self):
        s = parse("a\nb\nc")
        assert len(s.items) == 3

    def test_nested_procsub(self):
        p = first_pipeline("sort <(cat f | grep x)")
        ps = p.commands[0].words[1].segments[0][1]
        assert isinstance(ps.body.items[0], Pipeline)


class TestExpand:
    def test_expand_simple_var(self):
        (w,) = [t.value for t in tokenize("$base/file") if t.kind == "WORD"]
        assert expand_word(w, {"base": "/x"}) == "/x/file"

    def test_expand_unknown_var_none(self):
        (w,) = [t.value for t in tokenize("$nope") if t.kind == "WORD"]
        assert expand_word(w, {}) is None

    def test_expand_cmdsub_none(self):
        (w,) = [t.value for t in tokenize("$(date)") if t.kind == "WORD"]
        assert expand_word(w, {}) is None

    def test_brace_range(self):
        assert brace_expand("{2015..2018}") == ["2015", "2016", "2017", "2018"]

    def test_brace_range_reverse(self):
        assert brace_expand("{3..1}") == ["3", "2", "1"]

    def test_brace_list(self):
        assert brace_expand("a{x,y}b") == ["axb", "ayb"]

    def test_brace_nested_product(self):
        assert brace_expand("{1..2}{a,b}") == ["1a", "1b", "2a", "2b"]

    def test_no_brace(self):
        assert brace_expand("plain") == ["plain"]
