"""Line-processing commands: cat, grep, tr, cut, sed, head, tail, tac, col.

GNU semantics under ``LC_ALL=C``; deviations are noted per command. The
``tr`` implementation is *line-based* (each input line is transformed
independently; outputs containing ``\\n`` fan out into multiple lines, and
empty fragments are dropped when newlines are squeezed). For the pipeline
shapes in the paper's benchmarks this is byte-identical to GNU tr — the
equivalence is exercised against ``/usr/bin/tr`` in tests.
"""
from __future__ import annotations

import re
from typing import Dict, List, Optional, Tuple

from .base import CommandError, ExecEnv, parse_opts, register, resolve_streams

# --------------------------------------------------------------------------
# regex dialect: convert POSIX BRE (grep/sed default) to Python's re syntax
# --------------------------------------------------------------------------

_BRE_SPECIALS = "+?|(){}"


def bre_to_python(pat: str) -> str:
    """Convert a POSIX *basic* regular expression to Python ``re`` syntax.

    In BRE, ``+ ? | ( ) { }`` are literals and their escaped forms are the
    operators; in Python/ERE it is the opposite — so we swap the escaping.
    Bracket expressions are passed through verbatim.
    """
    out: List[str] = []
    i, n = 0, len(pat)
    while i < n:
        c = pat[i]
        if c == "\\" and i + 1 < n:
            nxt = pat[i + 1]
            if nxt in _BRE_SPECIALS:
                out.append(nxt)  # \( -> (   (operator)
            else:
                out.append("\\" + nxt)
            i += 2
        elif c == "[":
            j = i + 1
            if j < n and pat[j] == "^":
                j += 1
            if j < n and pat[j] == "]":
                j += 1
            while j < n and pat[j] != "]":
                if pat[j] == "[" and j + 1 < n and pat[j + 1] in ":.=":
                    k = pat.find(pat[j + 1] + "]", j + 2)
                    if k < 0:
                        raise CommandError("unterminated character class")
                    j = k + 2
                else:
                    j += 1
            if j >= n:
                raise CommandError("unterminated bracket expression")
            out.append(_posix_classes(pat[i : j + 1]))
            i = j + 1
        elif c in _BRE_SPECIALS:
            out.append("\\" + c)  # literal in BRE
            i += 1
        else:
            out.append(c)
            i += 1
    return "".join(out)


def _posix_classes(bracket: str) -> str:
    """Rewrite ``[:alpha:]`` etc. inside a bracket expression for Python re."""
    return (
        bracket.replace("[:alpha:]", "a-zA-Z")
        .replace("[:digit:]", "0-9")
        .replace("[:alnum:]", "a-zA-Z0-9")
        .replace("[:upper:]", "A-Z")
        .replace("[:lower:]", "a-z")
        .replace("[:space:]", " \\t\\n\\r\\f\\v")
        .replace("[:punct:]", re.escape("!\"#$%&'()*+,-./:;<=>?@[\\]^_`{|}~"))
        .replace("[:blank:]", " \\t")
    )


def compile_grep_pattern(pat: str, *, ere: bool, fixed: bool, icase: bool) -> re.Pattern:
    if fixed:
        body = re.escape(pat)
    elif ere:
        body = _posix_classes_everywhere(pat)
    else:
        body = bre_to_python(pat)
    return re.compile(body, re.IGNORECASE if icase else 0)


def _posix_classes_everywhere(pat: str) -> str:
    # For ERE we only need the POSIX class names rewritten; the rest of the
    # syntax coincides with Python's for the patterns the benchmarks use.
    return _posix_classes(pat)


# --------------------------------------------------------------------------
# cat
# --------------------------------------------------------------------------


@register("cat")
def cat(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="n")
    lines = resolve_streams(operands, stdin, env)
    if opts.get("n"):
        return [f"{i + 1:6d}\t{l}" for i, l in enumerate(lines)]
    return list(lines)


# --------------------------------------------------------------------------
# grep
# --------------------------------------------------------------------------


@register("grep")
def grep(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="ivcExFwh")
    if not operands:
        raise CommandError("grep: missing pattern")
    pat, files = operands[0], operands[1:]
    if len(files) > 1:
        # GNU grep prefixes matches with filenames for >1 file; we keep the
        # single-stream contract (the paper's pipelines use <=1 operand).
        raise CommandError("grep: at most one file operand supported")
    rx = compile_grep_pattern(
        pat, ere=bool(opts.get("E")), fixed=bool(opts.get("F")), icase=bool(opts.get("i"))
    )
    lines = resolve_streams(files, stdin, env)
    invert = bool(opts.get("v"))
    if opts.get("x"):
        matched = [l for l in lines if bool(rx.fullmatch(l)) != invert]
    elif opts.get("w"):
        wrx = re.compile(r"(?<![0-9A-Za-z_])(?:" + rx.pattern + r")(?![0-9A-Za-z_])", rx.flags)
        matched = [l for l in lines if bool(wrx.search(l)) != invert]
    else:
        matched = [l for l in lines if bool(rx.search(l)) != invert]
    if opts.get("c"):
        return [str(len(matched))]
    return matched


# --------------------------------------------------------------------------
# tr
# --------------------------------------------------------------------------

_TR_CLASSES = {
    "alpha": "ABCDEFGHIJKLMNOPQRSTUVWXYZabcdefghijklmnopqrstuvwxyz",
    "upper": "ABCDEFGHIJKLMNOPQRSTUVWXYZ",
    "lower": "abcdefghijklmnopqrstuvwxyz",
    "digit": "0123456789",
    "alnum": "0123456789ABCDEFGHIJKLMNOPQRSTUVWXYZabcdefghijklmnopqrstuvwxyz",
    "space": " \t\n\r\f\v",
    "blank": " \t",
    "punct": "!\"#$%&'()*+,-./:;<=>?@[\\]^_`{|}~",
}
_TR_ESCAPES = {"n": "\n", "t": "\t", "r": "\r", "f": "\f", "v": "\v", "a": "\a", "b": "\b", "\\": "\\"}


def _tr_set(spec: str) -> str:
    """Expand a tr SET: escapes, ``a-z`` ranges, ``[:class:]`` names."""
    out: List[str] = []
    i, n = 0, len(spec)
    while i < n:
        c = spec[i]
        if c == "\\" and i + 1 < n:
            out.append(_TR_ESCAPES.get(spec[i + 1], spec[i + 1]))
            i += 2
        elif c == "[" and spec.startswith("[:", i):
            k = spec.find(":]", i + 2)
            if k < 0:
                raise CommandError("tr: unterminated [:class:]")
            name = spec[i + 2 : k]
            if name not in _TR_CLASSES:
                raise CommandError(f"tr: unknown class {name}")
            out.append(_TR_CLASSES[name])
            i = k + 2
        elif i + 2 < n and spec[i + 1] == "-" and spec[i + 2] != "]":
            lo, hi = ord(c), ord(spec[i + 2])
            if hi < lo:
                raise CommandError("tr: reversed range")
            out.append("".join(chr(x) for x in range(lo, hi + 1)))
            i += 3
        else:
            out.append(c)
            i += 1
    return "".join(out)


@register("tr")
def tr(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="csdC")
    comp = bool(opts.get("c") or opts.get("C"))
    squeeze, delete = bool(opts.get("s")), bool(opts.get("d"))
    if delete:
        if len(operands) != 1:
            raise CommandError("tr -d: expected one set")
        set1, set2 = _tr_set(operands[0]), ""
    else:
        if len(operands) == 1 and squeeze:
            set1, set2 = _tr_set(operands[0]), ""
        elif len(operands) == 2:
            set1, set2 = _tr_set(operands[0]), _tr_set(operands[1])
        else:
            raise CommandError("tr: expected SET1 SET2")

    out: List[str] = []
    squeeze_nl = False
    if delete:
        member = set(set1)
        if comp:
            delete_fn = lambda s: "".join(ch for ch in s if ch in member)
        else:
            delete_fn = lambda s: "".join(ch for ch in s if ch not in member)
        transform = delete_fn
        squeeze_set = set()
    elif set2:
        if comp:
            # complement translate: every char NOT in set1 maps to last of set2
            tgt = set2[-1]
            member = set(set1)
            transform = lambda s: "".join(ch if ch in member else tgt for ch in s)
            squeeze_set = set(set2) if squeeze else set()
        else:
            if len(set2) < len(set1):
                set2 = set2 + set2[-1] * (len(set1) - len(set2))
            table = str.maketrans(set1, set2[: len(set1)])
            transform = lambda s: s.translate(table)
            squeeze_set = set(set2) if squeeze else set()
    else:  # squeeze only
        transform = lambda s: s
        member = set(set1)
        squeeze_set = (set(_all_chars()) - member) if comp else member
    squeeze_nl = "\n" in squeeze_set

    def do_squeeze(s: str) -> str:
        if not squeeze_set:
            return s
        buf: List[str] = []
        prev: Optional[str] = None
        for ch in s:
            if ch == prev and ch in squeeze_set:
                continue
            buf.append(ch)
            prev = ch
        return "".join(buf)

    for line in stdin:
        t = do_squeeze(transform(line))
        if "\n" in t:
            parts = t.split("\n")
            out.extend(p for p in parts if p != "") if squeeze_nl else out.extend(parts)
        else:
            if t == "" and squeeze_nl:
                continue  # empty line squeezed into the surrounding newlines
            out.append(t)
    return out


def _all_chars() -> str:
    return "".join(chr(i) for i in range(256))


# --------------------------------------------------------------------------
# cut
# --------------------------------------------------------------------------


def _parse_list(spec: str, upper: int = 1 << 20) -> List[Tuple[int, int]]:
    """Parse a cut LIST like ``1,3`` / ``2-4`` / ``-3`` / ``5-`` into ranges."""
    ranges: List[Tuple[int, int]] = []
    for part in spec.split(","):
        if not part:
            raise CommandError("cut: empty list element")
        if "-" in part:
            lo_s, hi_s = part.split("-", 1)
            lo = int(lo_s) if lo_s else 1
            hi = int(hi_s) if hi_s else upper
        else:
            lo = hi = int(part)
        if lo < 1 or hi < lo:
            raise CommandError(f"cut: bad range {part}")
        ranges.append((lo, hi))
    return ranges


@register("cut")
def cut(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="s", with_arg="dfcb")
    lines = resolve_streams(operands, stdin, env)
    out: List[str] = []
    if "c" in opts or "b" in opts:
        ranges = _parse_list(str(opts.get("c") or opts.get("b")))
        for l in lines:
            out.append("".join(l[lo - 1 : hi] for lo, hi in ranges))
        return out
    if "f" in opts:
        delim = str(opts.get("d", "\t"))
        if len(delim) != 1:
            raise CommandError("cut: delimiter must be a single character")
        ranges = _parse_list(str(opts["f"]))
        only_delimited = bool(opts.get("s"))
        for l in lines:
            if delim not in l:
                if not only_delimited:
                    out.append(l)
                continue
            fields = l.split(delim)
            picked: List[str] = []
            seen = set()
            for lo, hi in ranges:
                for idx in range(lo, min(hi, len(fields)) + 1):
                    if idx not in seen:
                        seen.add(idx)
                        picked.append(fields[idx - 1])
            out.append(delim.join(picked))
        return out
    raise CommandError("cut: need -f or -c")


# --------------------------------------------------------------------------
# sed (subset): s///, address d, address p with -n, q
# --------------------------------------------------------------------------

_SED_CMD = re.compile(r"^\s*(?:(\$|\d+(?:,\$|,\d+)?|/(?:[^/\\]|\\.)*/)\s*)?([sdpq=])")


def _parse_sed_script(script: str):
    """Parse a (possibly ``;``-separated) sed script into command tuples."""
    cmds = []
    rest = script
    while rest.strip():
        m = _SED_CMD.match(rest)
        if not m:
            raise CommandError(f"sed: unsupported script {script!r}")
        addr, op = m.group(1), m.group(2)
        rest = rest[m.end() :]
        if op == "s":
            if not rest:
                raise CommandError("sed: bad s command")
            delim = rest[0]
            parts: List[str] = []
            buf: List[str] = []
            i = 1
            while i < len(rest) and len(parts) < 2:
                if rest[i] == "\\" and i + 1 < len(rest):
                    buf.append(rest[i : i + 2])
                    i += 2
                elif rest[i] == delim:
                    parts.append("".join(buf))
                    buf = []
                    i += 1
                else:
                    buf.append(rest[i])
                    i += 1
            if len(parts) < 2:
                raise CommandError("sed: unterminated s command")
            # flags until ';' or end
            j = i
            while j < len(rest) and rest[j] not in ";":
                j += 1
            flags = rest[i:j].strip()
            rest = rest[j:]
            cmds.append(("s", addr, parts[0], parts[1], flags))
        else:
            cmds.append((op, addr, None, None, None))
        rest = rest.lstrip()
        if rest.startswith(";"):
            rest = rest[1:]
    return cmds


def _addr_match(addr: Optional[str], lineno: int, total: int, line: str) -> bool:
    if addr is None:
        return True
    if addr == "$":
        return lineno == total
    if addr.startswith("/"):
        pat = addr[1:-1]
        return re.search(bre_to_python(pat), line) is not None
    if "," in addr:
        lo_s, hi_s = addr.split(",", 1)
        lo = int(lo_s)
        hi = total if hi_s == "$" else int(hi_s)
        return lo <= lineno <= hi
    return lineno == int(addr)


def _sed_repl(repl: str) -> str:
    """Convert a sed replacement (&, \\1..\\9) to Python's template syntax."""
    out: List[str] = []
    i = 0
    while i < len(repl):
        c = repl[i]
        if c == "\\" and i + 1 < len(repl):
            nxt = repl[i + 1]
            if nxt.isdigit():
                out.append("\\" + nxt)
            elif nxt == "n":
                out.append("\n")
            elif nxt == "&":
                out.append("&")
            else:
                out.append(re.escape(nxt) if nxt == "\\" else nxt)
            i += 2
        elif c == "&":
            out.append("\\g<0>")
            i += 1
        else:
            out.append(c.replace("\\", "\\\\"))
            i += 1
    return "".join(out)


@register("sed")
def sed(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="n", with_arg="e")
    scripts: List[str] = []
    if "e" in opts:
        scripts.append(str(opts["e"]))
        files = operands
    else:
        if not operands:
            raise CommandError("sed: missing script")
        scripts.append(operands[0])
        files = operands[1:]
    cmds = [c for s in scripts for c in _parse_sed_script(s)]
    lines = resolve_streams(files, stdin, env)
    total = len(lines)
    quiet = bool(opts.get("n"))
    out: List[str] = []
    for lineno, line in enumerate(lines, 1):
        deleted = False
        quit_after = False
        cur = line
        for op, addr, pat, repl, flags in cmds:
            if not _addr_match(addr, lineno, total, cur):
                continue
            if op == "d":
                deleted = True
                break
            if op == "q":
                quit_after = True
            elif op == "p":
                out.append(cur)
            elif op == "=":
                out.append(str(lineno))
            elif op == "s":
                count = 0 if "g" in (flags or "") else 1
                cur = re.sub(bre_to_python(pat or ""), _sed_repl(repl or ""), cur, count=count)
        if not deleted and not quiet:
            # a substitution may inject newlines (e.g. s/ /\n/g): fan out
            out.extend(cur.split("\n")) if "\n" in cur else out.append(cur)
        if quit_after:
            break
    return out


# --------------------------------------------------------------------------
# head / tail / tac / col
# --------------------------------------------------------------------------


@register("head")
def head(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, with_arg="n")
    n = int(str(opts.get("n", "10")))
    lines = resolve_streams(operands, stdin, env)
    return lines[:n]


@register("tail")
def tail(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, with_arg="n")
    spec = str(opts.get("n", "10"))
    lines = resolve_streams(operands, stdin, env)
    if spec.startswith("+"):
        start = int(spec[1:])
        return lines[max(0, start - 1) :]
    return lines[-int(spec) :] if int(spec) > 0 else []


@register("tac")
def tac(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    _, operands = parse_opts(argv)
    lines = resolve_streams(operands, stdin, env)
    return list(reversed(lines))


@register("col")
def col(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    """``col -bx``: resolve backspaces, expand tabs — on clean text this is
    control-character stripping; classified S like the original."""
    parse_opts(argv, flags="bx")
    return [l.replace("\b", "").replace("\t", " " * 8) for l in stdin]
