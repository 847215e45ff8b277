"""§6.5 GNU-parallel comparison: the reproduction of the paper's
correctness claim — blanket parallelization breaks ⓟ pipelines (the paper
measures 92% differing output); PaSh's conservative transformations do not.
"""
import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.runtime.naive_parallel import diff_fraction, naive_parallel
from repro.workloads.inputs import bio_reads, text_corpus


@pytest.fixture(scope="module")
def env():
    return ExecEnv(files={"in.txt": text_corpus(3000, seed=0),
                          "reads.txt": bio_reads(1500)})


def fresh(env):
    return ExecEnv(files=dict(env.files))


class TestNaiveParallelCorrectness:
    def test_stateless_pipeline_survives_naive(self, spark, env):
        """All-S pipelines are exactly the embarrassingly-parallel case GNU
        parallel handles: naive chunking is correct."""
        script = "cat in.txt | tr A-Z a-z | grep the"
        seq = pash_seq(script, fresh(env))
        naive = naive_parallel(spark, script, fresh(env),
                               input_file="in.txt", width=6)
        assert naive == seq

    def test_sort_pipeline_breaks_under_naive(self, spark, env):
        script = "cat in.txt | tr A-Z a-z | sort"
        seq = pash_seq(script, fresh(env))
        naive = naive_parallel(spark, script, fresh(env),
                               input_file="in.txt", width=6)
        assert naive != seq
        assert sorted(naive) == sorted(seq)  # same bag, wrong order

    def test_uniq_histogram_breaks_badly_under_naive(self, spark, env):
        """The paper's 92%-differing-output scenario: counts split across
        chunks make most lines wrong."""
        script = ('cat in.txt | tr -cs A-Za-z "\\n" | tr A-Z a-z | sort '
                  "| uniq -c | sort -rn")
        seq = pash_seq(script, fresh(env))
        naive = naive_parallel(spark, script, fresh(env),
                               input_file="in.txt", width=6)
        frac = diff_fraction(seq, naive)
        assert frac > 0.5, f"expected most lines to differ, got {frac:.0%}"

    def test_pash_is_correct_where_naive_is_not(self, spark, env):
        script = ('cat in.txt | tr -cs A-Za-z "\\n" | tr A-Z a-z | sort '
                  "| uniq -c | sort -rn")
        seq = pash_seq(script, fresh(env))
        pash = pash_spark(spark, script, fresh(env), width=6)
        assert pash == seq

    def test_bio_pipeline_matches_paper_structure(self, spark, env):
        """The §6.5 bio script: PaSh correct; naive-everywhere wrong."""
        script = ('cat reads.txt | cutadapt_sim | grep -E ".{30,}" '
                  "| cut -c 1-8 | sort | uniq -c | sort -rn")
        seq = pash_seq(script, fresh(env))
        assert pash_spark(spark, script, fresh(env), width=4) == seq
        naive = naive_parallel(spark, script, fresh(env),
                               input_file="reads.txt", width=4)
        assert diff_fraction(seq, naive) > 0.5


def test_diff_fraction_basics():
    assert diff_fraction([], []) == 0.0
    assert diff_fraction(["a"], ["a"]) == 0.0
    assert diff_fraction(["a"], ["b"]) == 1.0
    assert diff_fraction(["a", "b"], ["a"]) == 0.5
