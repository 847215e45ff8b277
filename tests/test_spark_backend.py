"""Spark backend correctness: PaSh-on-Spark output equals the sequential
shell semantics, byte for byte, for every benchmark script — plus DuckDB
oracle cross-checks for the query-shaped results.
"""
import random

import pandas as pd
import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.oracle import assert_equivalent
from repro.runtime.stream import SparkStream
from repro.workloads import ONELINERS, UNIX50
from repro.workloads import noaa, webindex
from repro.workloads.inputs import text_corpus


def fresh(env):
    return ExecEnv(files=dict(env.files), ftypes=dict(env.ftypes))


@pytest.fixture(scope="module")
def corpus_env():
    return ExecEnv(files={
        "in.txt": text_corpus(4000, seed=0),
        "in2.txt": text_corpus(4000, seed=1),
    })


class TestStream:
    def test_from_lines_roundtrip(self, spark):
        lines = [f"l{i}" for i in range(100)]
        st = SparkStream.from_lines(spark, lines, 4)
        assert st.n_parts == 4
        assert st.collect_lines() == lines

    def test_empty_stream(self, spark):
        st = SparkStream.from_lines(spark, [])
        assert st.collect_lines() == [] and st.count() == 0

    def test_cat_preserves_order(self, spark):
        a = SparkStream.from_lines(spark, ["a1", "a2"], 2)
        b = SparkStream.from_lines(spark, ["b1"], 1)
        assert SparkStream.cat([a, b]).collect_lines() == ["a1", "a2", "b1"]

    def test_split_contiguous(self, spark):
        lines = [str(i) for i in range(103)]
        st = SparkStream.from_lines(spark, lines).split(4)
        assert st.n_parts == 4
        assert st.collect_lines() == lines
        parts = st.collect_parts()
        assert sorted(len(p) for p in parts) == [25, 26, 26, 26]
        assert sum(parts, []) == lines

    def test_per_chunk_fusion(self, spark):
        lines = ["b", "a", "c"] * 10
        st = SparkStream.from_lines(spark, lines, 3)
        out = st.per_chunk(lambda ls: [l.upper() for l in ls]) \
                .per_chunk(lambda ls: [l + "!" for l in ls])
        assert len(out.pending) == 2  # fused, not yet materialized
        assert out.collect_lines() == [l.upper() + "!" for l in lines]

    def test_aggregate_sees_ordered_parts(self, spark):
        lines = [str(i) for i in range(30)]
        st = SparkStream.from_lines(spark, lines, 3)
        agg = st.aggregate(lambda parts: [f"{len(parts)}:{parts[0][0]}:{parts[-1][-1]}"])
        assert agg.collect_lines() == ["3:0:29"]

    def test_split_of_split(self, spark):
        lines = [str(i) for i in range(50)]
        st = SparkStream.from_lines(spark, lines, 3).split(5)
        assert st.n_parts == 5 and st.collect_lines() == lines


SPARK_SCRIPTS = [
    "cat in.txt | tr A-Z a-z | grep the",
    "cat in.txt | tr A-Z a-z | sort",
    'cat in.txt | tr -cs A-Za-z "\\n" | sort | uniq -c | sort -rn | head -n 5',
    "cat in.txt | tr A-Z a-z | sort | sort -r",
    "cat in.txt in2.txt | sort -u",
    "sort <(cat in.txt | grep the) <(grep of in2.txt)",
    "cat in.txt | sha1sum",
    "cat in.txt | grep -c the",
    'cat in.txt | tr -cs A-Za-z "\\n" | bigrams_aux | sort | uniq',
    "cat in.txt | tac | head -n 7",
]


@pytest.mark.parametrize("width", [2, 7])
@pytest.mark.parametrize("script", SPARK_SCRIPTS)
def test_spark_equals_seq(spark, corpus_env, script, width):
    seq = pash_seq(script, fresh(corpus_env))
    par = pash_spark(spark, script, fresh(corpus_env), width=width)
    assert par == seq


@pytest.mark.parametrize("script", SPARK_SCRIPTS[:6])
def test_spark_nosplit_equals_seq(spark, corpus_env, script):
    seq = pash_seq(script, fresh(corpus_env))
    par = pash_spark(spark, script, fresh(corpus_env), width=4, enable_split=False)
    assert par == seq


ALL_WL = list(ONELINERS.items()) + list(UNIX50.items())


@pytest.mark.parametrize("name,wl", ALL_WL, ids=[n for n, _ in ALL_WL])
def test_workloads_on_spark(spark, name, wl):
    env = wl.make_env(0.004)
    seq = pash_seq(wl.script, fresh(env))
    par = pash_spark(spark, wl.script, fresh(env), width=4)
    assert par == seq


def test_noaa_on_spark(spark):
    env = noaa.make_env(0.05)
    seq = pash_seq(noaa.FULL, fresh(env))
    par = pash_spark(spark, noaa.FULL, fresh(env), width=3)
    assert par == seq


def test_webindex_on_spark(spark):
    env = webindex.make_env(0.02)
    seq = pash_seq(webindex.SCRIPT, fresh(env))
    par = pash_spark(spark, webindex.SCRIPT, fresh(env), width=3)
    assert par == seq


class TestOracle:
    """DuckDB cross-checks: the PaSh-on-Spark result, loaded as a
    DataFrame, must match the equivalent SQL over the raw input."""

    def _df(self, spark, lines, cols):
        return spark.createDataFrame(pd.DataFrame(cols(lines)))

    def test_grep_filter_oracle(self, spark, corpus_env):
        out = pash_spark(spark, "cat in.txt | grep the | sort -u",
                         fresh(corpus_env), width=4)
        got = spark.createDataFrame(pd.DataFrame({"line": out}))
        inp = pd.DataFrame({"line": corpus_env.files["in.txt"]})
        assert_equivalent(
            got,
            "SELECT DISTINCT line FROM inp WHERE line LIKE '%the%'",
            inp=inp,
        )

    def test_wc_count_oracle(self, spark, corpus_env):
        out = pash_spark(spark, "cat in.txt | grep the | wc -l",
                         fresh(corpus_env), width=4)
        got = spark.createDataFrame(pd.DataFrame({"n": [int(out[0])]}))
        inp = pd.DataFrame({"line": corpus_env.files["in.txt"]})
        assert_equivalent(
            got,
            "SELECT CAST(count(*) AS BIGINT) AS n FROM inp WHERE line LIKE '%the%'",
            inp=inp,
        )

    def test_word_histogram_oracle(self, spark, corpus_env):
        script = 'cat in.txt | tr -cs A-Za-z "\\n" | tr A-Z a-z | sort | uniq -c'
        out = pash_spark(spark, script, fresh(corpus_env), width=4)
        rows = [(int(l[:7]), l[8:]) for l in out]
        got = spark.createDataFrame(pd.DataFrame(rows, columns=["n", "word"]))
        inp = pd.DataFrame({"line": corpus_env.files["in.txt"]})
        assert_equivalent(
            got,
            """
            SELECT CAST(count(*) AS BIGINT) AS n, word FROM (
              SELECT lower(unnest(regexp_extract_all(line, '[A-Za-z]+'))) AS word
              FROM inp
            ) GROUP BY word
            """,
            inp=inp,
        )

    def test_sort_content_oracle(self, spark, corpus_env):
        out = pash_spark(spark, "cat in.txt | tr A-Z a-z | sort",
                         fresh(corpus_env), width=4)
        got = spark.createDataFrame(pd.DataFrame({"line": out}))
        inp = pd.DataFrame({"line": corpus_env.files["in.txt"]})
        assert_equivalent(got, "SELECT lower(line) AS line FROM inp", inp=inp)

    def test_noaa_max_oracle(self, spark):
        """The NOAA answer equals SQL MAX over the decoded raw records."""
        import base64
        import gzip

        env = noaa.make_env(0.05)
        out = pash_spark(spark, noaa.FULL, fresh(env), width=3)
        rows = []
        for l in out:
            year, temp = l.removeprefix("Maximum temperature for ").split(" is: ")
            rows.append((int(year), temp))
        got = spark.createDataFrame(pd.DataFrame(rows, columns=["year", "max_t"]))

        recs = []
        for name, content in env.files.items():
            if name.endswith(".gz"):
                year = int(name.split("/")[1])
                text = gzip.decompress(base64.b64decode(content[0])).decode()
                for rec in text.split("\n")[:-1]:
                    recs.append((year, rec[88:92]))
        raw = pd.DataFrame(recs, columns=["year", "t"])
        assert_equivalent(
            got,
            "SELECT year, max(t) AS max_t FROM raw "
            "WHERE t NOT LIKE '%999%' GROUP BY year",
            raw=raw,
        )
