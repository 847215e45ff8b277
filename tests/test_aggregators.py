"""Aggregator-library invariant (§3.2): for every ⓟ command with a
(map, aggregate) pair, ``agg(m(x1), ..., m(xn)) == f(x1 · ... · xn)`` —
property-tested over random streams and chunkings, plus binary-tree
composability for the aggregators the transformation uses in tree form.
"""
import random

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.annotations import resolve_invocation
from repro.commands import ExecEnv, run_cli
from repro.compiler.backend_seq import split_chunks
from repro.runtime.aggregators import AGGREGATORS, aggregate

WORDS = ["aa", "ab", "ba", "bb", "Cc", "dd", "e", ""]


def stream(seed, n=200):
    random.seed(seed)
    return [random.choice(WORDS) + random.choice(["", " x", " 42"])
            for _ in range(n)]


# (command, argv) -> the whole-command semantics to check the pair against
PAIRS = [
    ("sort", []),
    ("sort", ["-r"]),
    ("sort", ["-n"]),
    ("sort", ["-rn"]),
    ("sort", ["-u"]),
    ("uniq", []),
    ("uniq", ["-c"]),
    ("wc", ["-l"]),
    ("wc", ["-lw"]),
    ("wc", []),
    ("head", ["-n", "7"]),
    ("tail", ["-n", "7"]),
    ("tac", []),
    ("cat", ["-n"]),
    ("nl", []),
    ("grep", ["-c", "a"]),
    ("bigrams_aux", []),
    ("trigrams_aux", []),
]


def run_pair(name, argv, chunks):
    """Run map stage per chunk, then the aggregator."""
    res = resolve_invocation(name, argv)
    assert res.aggregator, (name, argv)
    if res.map_argv:
        m_cmd, m_argv = res.map_argv[0], res.map_argv[1:]
    else:
        m_cmd, m_argv = name, argv
    parts = [run_cli(m_cmd, list(m_argv), c, ExecEnv()) for c in chunks]
    return aggregate(res.aggregator, parts, res)


@pytest.mark.parametrize("width", [1, 2, 3, 7])
@pytest.mark.parametrize("name,argv", PAIRS, ids=[f"{n} {' '.join(a)}" for n, a in PAIRS])
def test_map_aggregate_equals_whole(name, argv, width):
    lines = stream(hash((name, tuple(argv))) % 1000)
    # sort/uniq/comm expect sorted input where the sequential command
    # would see it sorted? No: the invariant is over *arbitrary* input —
    # f(x) == agg(maps of chunks of x) must hold for the same x.
    expected = run_cli(name, argv, lines, ExecEnv())
    got = run_pair(name, argv, split_chunks(lines, width))
    assert got == expected


@pytest.mark.parametrize("name,argv", [("sort", []), ("uniq", []), ("uniq", ["-c"]),
                                       ("wc", ["-lw"]), ("head", ["-n", "5"]),
                                       ("tac", []), ("grep", ["-c", "a"])],
                         ids=["sort", "uniq", "uniq-c", "wc", "head", "tac", "grep-c"])
def test_binary_tree_composition(name, argv):
    """BINARY_AGGS must be associative & closed: folding pairwise equals
    the n-ary application (this is what the expanded DFG's agg trees do)."""
    res = resolve_invocation(name, argv)
    lines = stream(42, 300)
    chunks = split_chunks(lines, 5)
    parts = [run_cli(name, argv, c, ExecEnv()) for c in chunks]
    nary = aggregate(res.aggregator, parts, res)
    level = parts
    while len(level) > 1:
        nxt = []
        for i in range(0, len(level) - 1, 2):
            nxt.append(aggregate(res.aggregator, [level[i], level[i + 1]], res))
        if len(level) % 2:
            nxt.append(level[-1])
        level = nxt
    assert level[0] == nary


@given(st.lists(st.text(alphabet="abC 1", max_size=6), max_size=60),
       st.integers(min_value=1, max_value=6))
@settings(max_examples=60, deadline=None)
@pytest.mark.parametrize("name,argv", [("sort", []), ("uniq", []), ("uniq", ["-c"]),
                                       ("wc", []), ("bigrams_aux", [])],
                         ids=["sort", "uniq", "uniq-c", "wc", "bigrams"])
def test_pair_invariant_hypothesis(name, argv, lines, width):
    expected = run_cli(name, argv, lines, ExecEnv())
    got = run_pair(name, argv, split_chunks(lines, width))
    assert got == expected


def test_sort_m_cli_merges():
    a = sorted(stream(1, 50))
    b = sorted(stream(2, 50))
    env = ExecEnv(files={"a": a, "b": b})
    assert run_cli("sort", ["-m", "a", "b"], [], env) == sorted(a + b)


def test_uniq_c_agg_rejects_garbage():
    res = resolve_invocation("uniq", ["-c"])
    with pytest.raises(ValueError):
        aggregate("uniq_c", [["not a uniq -c line"]], res)


def test_all_binary_aggs_registered():
    from repro.dfg.transform import BINARY_AGGS

    assert BINARY_AGGS <= set(AGGREGATORS)
