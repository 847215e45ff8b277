"""Ordering commands: sort (incl. ``-m`` merge), uniq, comm.

``sort`` follows GNU semantics under ``LC_ALL=C``: byte comparison, ``-n``
leading-numeric comparison with whole-line last-resort tiebreak, ``-r``
reversing the total order, ``-u`` keeping the first of equal keys, ``-k``
field keys (supported with an explicit ``-t`` separator), and ``-m``
merging already-sorted inputs (the aggregator the paper highlights §5).
"""
from __future__ import annotations

import functools
import re
from typing import Callable, List, Tuple

from .base import CommandError, ExecEnv, parse_opts, register, resolve_streams

_NUM_PREFIX = re.compile(r"^[ \t]*(-?\d*\.?\d*)")


def numeric_value(s: str) -> float:
    m = _NUM_PREFIX.match(s)
    tok = m.group(1) if m else ""
    if tok in ("", "-", ".", "-."):
        return 0.0
    try:
        return float(tok)
    except ValueError:
        return 0.0


def _field(line: str, idx: int, sep: str) -> str:
    """1-based field extraction with an explicit separator."""
    parts = line.split(sep)
    return parts[idx - 1] if idx <= len(parts) else ""


def make_sort_key(opts) -> Callable[[str], Tuple]:
    """Build the GNU-compatible sort key. The key tuple always ends with the
    whole line (the last-resort comparison); ``-r`` is applied globally by
    the caller via ``reverse=True``, matching GNU's total-order reversal."""
    numeric = bool(opts.get("n"))
    keys = opts.get("k") or []
    sep = opts.get("t")
    if keys and sep is None:
        raise CommandError("sort: -k requires an explicit -t separator here")

    def key(line: str) -> Tuple:
        parts: List = []
        if keys:
            for kspec in keys:
                spec = str(kspec)
                knum = numeric
                krev = False
                for mod in ("n", "r"):
                    if spec.endswith(mod):
                        if mod == "n":
                            knum = True
                        else:
                            krev = True
                        spec = spec[:-1]
                if "," in spec:
                    lo_s, hi_s = spec.split(",", 1)
                    hi_s = hi_s.rstrip("nr")
                    lo, hi = int(lo_s), int(hi_s)
                else:
                    lo = int(spec)
                    hi = 1 << 20
                fields = line.split(str(sep))
                segment = str(sep).join(fields[lo - 1 : hi])
                k = numeric_value(segment) if knum else segment
                if krev:
                    raise CommandError("sort: per-key r modifier unsupported")
                parts.append(k)
        else:
            parts.append(numeric_value(line) if numeric else line)
        parts.append(line)
        return tuple(parts)

    return key


@register("sort")
def sort_cmd(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="rnums", with_arg="kt")
    key = make_sort_key(opts)
    rev = bool(opts.get("r"))
    if opts.get("m"):
        # merge mode: inputs are already sorted; equivalent to stable sort of
        # the concatenation under the same comparator (GNU documents -m as a
        # pure merge; for sorted inputs the results coincide).
        streams = (
            [stdin]
            if not operands
            else [stdin if op == "-" else env.read(op) for op in operands]
        )
        out = merge_sorted(streams, key=key, reverse=rev)
    else:
        lines = resolve_streams(operands, stdin, env)
        if opts.get("u"):
            # -u disables the last-resort whole-line comparison: among
            # key-equal lines GNU keeps the first in input order (stable)
            out = sorted(lines, key=lambda l: key(l)[:-1], reverse=rev)
        elif not opts.get("n") and not opts.get("k"):
            out = sorted(lines, reverse=rev)  # C-speed byte order
        else:
            out = sorted(lines, key=key, reverse=rev)
    if opts.get("u"):
        dedup: List[str] = []
        prev = object()
        for l in out:
            k = key(l)[:-1]  # -u compares keys, not whole lines
            if k != prev:
                dedup.append(l)
                prev = k
        return dedup
    return out


def merge_sorted(streams: List[List[str]], *, key, reverse: bool = False) -> List[str]:
    """k-way stable merge of sorted runs — the ``sort`` aggregator (§5)."""
    import heapq

    class _Rev:
        __slots__ = ("k",)

        def __init__(self, k):
            self.k = k

        def __lt__(self, other):
            return other.k < self.k

        def __eq__(self, other):
            return self.k == other.k

    wrap = (lambda l: _Rev(key(l))) if reverse else key
    return list(heapq.merge(*streams, key=wrap))


@register("uniq")
def uniq(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="cdi")
    lines = resolve_streams(operands, stdin, env)
    groups: List[Tuple[str, int]] = []
    fold = bool(opts.get("i"))
    for l in lines:
        cmp_l = l.lower() if fold else l
        if groups and (groups[-1][0].lower() if fold else groups[-1][0]) == cmp_l:
            groups[-1] = (groups[-1][0], groups[-1][1] + 1)
        else:
            groups.append((l, 1))
    if opts.get("c"):
        return [f"{n:7d} {l}" for l, n in groups]
    if opts.get("d"):
        return [l for l, n in groups if n > 1]
    return [l for l, _ in groups]


@register("comm")
def comm(argv: List[str], stdin: List[str], env: ExecEnv) -> List[str]:
    opts, operands = parse_opts(argv, flags="123")
    if len(operands) != 2:
        raise CommandError("comm: need exactly two files")
    a = stdin if operands[0] == "-" else env.read(operands[0])
    b = stdin if operands[1] == "-" else env.read(operands[1])
    show1, show2, show3 = not opts.get("1"), not opts.get("2"), not opts.get("3")
    pre2 = "\t" if show1 else ""
    pre3 = ("\t" if show1 else "") + ("\t" if show2 else "")
    out: List[str] = []
    i = j = 0
    while i < len(a) and j < len(b):
        if a[i] == b[j]:
            if show3:
                out.append(pre3 + a[i])
            i += 1
            j += 1
        elif a[i] < b[j]:
            if show1:
                out.append(a[i])
            i += 1
        else:
            if show2:
                out.append(pre2 + b[j])
            j += 1
    if show1:
        out.extend(a[i:])
        i = len(a)
    if show2:
        out.extend(pre2 + x for x in b[j:])
    return out
