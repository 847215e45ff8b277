"""§6.3 regeneration: NOAA weather pipeline — full / preprocessing /
processing phases, sequential vs PaSh (paper: 2.52x / 2.04x / 12.31x)."""
import os
import time

import pytest

from repro.commands.base import ExecEnv
from repro.compiler import pash_seq, pash_spark
from repro.workloads import noaa

SCALE = float(os.environ.get("BENCH_NOAA_SCALE", "4"))
WIDTH = 16


@pytest.fixture(scope="module")
def noaa_setup():
    base = noaa.make_env(SCALE)
    pre = ExecEnv(files=dict(base.files), ftypes=dict(base.ftypes))
    pash_seq(noaa.PREPROC, pre)  # compute phase needs temps_<y>.txt
    return base, pre


@pytest.mark.parametrize("phase", ["full", "preprocessing", "processing"])
def test_noaa_phase(benchmark, spark, noaa_setup, phase):
    base, pre = noaa_setup
    script, env0 = {
        "full": (noaa.FULL, base),
        "preprocessing": (noaa.PREPROC, base),
        "processing": (noaa.COMPUTE, pre),
    }[phase]

    t0 = time.perf_counter()
    seq_out = pash_seq(script, ExecEnv(files=dict(env0.files), ftypes=dict(env0.ftypes)))
    t_seq = time.perf_counter() - t0

    def run():
        return pash_spark(
            spark, script,
            ExecEnv(files=dict(env0.files), ftypes=dict(env0.ftypes)),
            width=WIDTH)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert out == seq_out
    benchmark.extra_info["seq_time_s"] = round(t_seq, 2)
    benchmark.extra_info["speedup"] = round(t_seq / benchmark.stats.stats.mean, 2)
