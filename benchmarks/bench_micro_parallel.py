"""§6.5 GNU-parallel regeneration on the bio pipeline: PaSh (4.3x paper)
vs bottleneck-only parallelization (1.8x paper) vs naive blanket
parallelization (fast but 92% wrong output in the paper)."""
import os
import time

import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.runtime.naive_parallel import diff_fraction, naive_parallel
from repro.workloads.inputs import bio_reads

N_READS = int(os.environ.get("BENCH_BIO_READS", "400000"))
WIDTH = 16

SCRIPT = ('cat reads.txt | cutadapt_sim | grep -E ".{30,}" | cut -c 1-8 '
          "| sort | uniq -c | sort -rn")
BOTTLENECK = "cat reads.txt | cutadapt_sim"
TAIL = ('cat trimmed.txt | grep -E ".{30,}" | cut -c 1-8 '
        "| sort | uniq -c | sort -rn")

_state = {}


def _setup():
    if not _state:
        reads = bio_reads(N_READS)
        t0 = time.perf_counter()
        seq = pash_seq(SCRIPT, ExecEnv(files={"reads.txt": reads}))
        _state.update(reads=reads, seq=seq, t_seq=time.perf_counter() - t0)
    return _state


def _record(benchmark, st):
    benchmark.extra_info["seq_time_s"] = round(st["t_seq"], 2)
    benchmark.extra_info["speedup"] = round(st["t_seq"] / benchmark.stats.stats.mean, 2)


def test_pash_whole_pipeline(benchmark, spark):
    st = _setup()

    def run():
        return pash_spark(spark, SCRIPT, ExecEnv(files={"reads.txt": st["reads"]}),
                          width=WIDTH)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == st["seq"]
    _record(benchmark, st)
    benchmark.extra_info["output"] = "identical"


def test_bottleneck_only(benchmark, spark):
    st = _setup()

    def run():
        env = ExecEnv(files={"reads.txt": st["reads"]})
        env.files["trimmed.txt"] = naive_parallel(
            spark, BOTTLENECK, env, input_file="reads.txt", width=WIDTH)
        return pash_seq(TAIL, env)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == st["seq"]
    _record(benchmark, st)
    benchmark.extra_info["output"] = "identical"


def test_naive_parallel_everywhere(benchmark, spark):
    st = _setup()

    def run():
        return naive_parallel(spark, SCRIPT,
                              ExecEnv(files={"reads.txt": st["reads"]}),
                              input_file="reads.txt", width=WIDTH)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    frac = diff_fraction(st["seq"], out)
    assert frac > 0.5  # the paper's point: fast but wrong
    _record(benchmark, st)
    benchmark.extra_info["output"] = f"{frac:.0%} lines differ from sequential"
