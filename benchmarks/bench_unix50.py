"""Fig. 11 regeneration: Unix50 pipelines, sequential vs PaSh width 16."""
import os
import time

import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.workloads import UNIX50

SCALE = float(os.environ.get("BENCH_SCALE", "0.5"))
WIDTH = 16


@pytest.mark.parametrize("name", list(UNIX50), ids=list(UNIX50))
def test_unix50_pash(benchmark, spark, name):
    wl = UNIX50[name]
    env = wl.make_env(SCALE)
    t0 = time.perf_counter()
    seq_out = pash_seq(wl.script, ExecEnv(files=dict(env.files)))
    t_seq = time.perf_counter() - t0

    def run():
        return pash_spark(spark, wl.script, ExecEnv(files=dict(env.files)),
                          width=WIDTH)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == seq_out
    benchmark.extra_info["seq_time_s"] = round(t_seq, 2)
    benchmark.extra_info["speedup"] = round(t_seq / benchmark.stats.stats.mean, 2)
    benchmark.extra_info["notes"] = wl.highlights
