"""§6.5 parallel-sort regeneration: PaSh's annotation-derived map+merge
sort (S_p) vs the hand-tuned native parallel sort (S_g ≙ Spark orderBy)."""
import os
import time

import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.workloads.inputs import text_corpus

N_LINES = int(os.environ.get("BENCH_SORT_LINES", "1500000"))
SCRIPT = "cat in.txt | sort"

_state = {}


def _setup(spark):
    if not _state:
        lines = text_corpus(N_LINES, seed=0)
        t0 = time.perf_counter()
        seq = pash_seq(SCRIPT, ExecEnv(files={"in.txt": lines}))
        _state.update(lines=lines, seq=seq, t_seq=time.perf_counter() - t0)
    return _state


@pytest.mark.parametrize("width", [4, 8, 16])
def test_pash_sort(benchmark, spark, width):
    st = _setup(spark)

    def run():
        return pash_spark(spark, SCRIPT, ExecEnv(files={"in.txt": st["lines"]}),
                          width=width)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == st["seq"]
    benchmark.extra_info["seq_time_s"] = round(st["t_seq"], 2)
    benchmark.extra_info["speedup"] = round(st["t_seq"] / benchmark.stats.stats.mean, 2)


def test_native_orderby_sort(benchmark, spark):
    """The S_g baseline: a parallel sort implemented by the 'command
    developer' (Spark) rather than derived from an annotation."""
    st = _setup(spark)
    import pandas as pd

    sdf = spark.createDataFrame(pd.DataFrame({"line": st["lines"]})).cache()
    sdf.count()

    def run():
        return sdf.orderBy("line").toPandas()["line"].tolist()

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == st["seq"]
    benchmark.extra_info["seq_time_s"] = round(st["t_seq"], 2)
    benchmark.extra_info["speedup"] = round(st["t_seq"] / benchmark.stats.stats.mean, 2)
    sdf.unpersist()
