"""§6.4 regeneration: web indexing with annotated foreign-language stages
(paper: 12.7x at width 16 on 1% of Wikipedia)."""
import os
import time

import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.workloads import webindex

SCALE = float(os.environ.get("BENCH_WEBINDEX_SCALE", "2"))
WIDTH = 16


@pytest.mark.parametrize("name,script", [
    ("index", webindex.SCRIPT),
    ("links", webindex.LINKS_SCRIPT),
], ids=["index", "links"])
def test_webindex(benchmark, spark, name, script):
    env = webindex.make_env(SCALE)
    t0 = time.perf_counter()
    seq_out = pash_seq(script, ExecEnv(files=dict(env.files)))
    t_seq = time.perf_counter() - t0

    def run():
        return pash_spark(spark, script, ExecEnv(files=dict(env.files)), width=WIDTH)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == seq_out
    benchmark.extra_info["seq_time_s"] = round(t_seq, 2)
    benchmark.extra_info["speedup"] = round(t_seq / benchmark.stats.stats.mean, 2)
