"""Tab. 2 regeneration: sequential time per one-liner (the table's
``Seq. Time`` column at our scale) plus compile time and transformed-DFG
node counts (``#Nodes``, ``Compile Time``) recorded as extra_info.

Run: ``pytest benchmarks/bench_table2_oneliners.py --benchmark-only``.
"""
import os

import pytest

from repro.commands.base import ExecEnv
from repro.compiler import compile_script
from repro.compiler.backend_seq import run_seq
from repro.dfg.transform import parallelize
from repro.workloads import ONELINERS

SCALE = float(os.environ.get("BENCH_SCALE", "0.5"))


@pytest.mark.parametrize("name", list(ONELINERS), ids=list(ONELINERS))
def test_seq_time(benchmark, name):
    wl = ONELINERS[name]
    env = wl.make_env(SCALE)
    cs = compile_script(wl.script)
    dfgs = [s.dfg for s in cs.steps if s.kind == "dfg"]
    benchmark.extra_info["nodes_w16"] = sum(len(parallelize(g, 16).nodes) for g in dfgs)
    benchmark.extra_info["nodes_w64"] = sum(len(parallelize(g, 64).nodes) for g in dfgs)
    benchmark.extra_info["structure"] = str(
        {k: v for g in dfgs for k, v in g.class_structure().items()})
    benchmark.extra_info["input_mb"] = round(
        sum(len(l) + 1 for f in env.files.values() for l in f) / 1e6, 1)

    def seq():
        return run_seq(cs, ExecEnv(files=dict(env.files), ftypes=dict(env.ftypes)))

    out = benchmark.pedantic(seq, rounds=1, iterations=1)
    assert out is not None


@pytest.mark.parametrize("name", list(ONELINERS), ids=list(ONELINERS))
def test_compile_time_w16(benchmark, name):
    """The Tab. 2 'Compile Time' column: frontend + width-16 transform."""
    wl = ONELINERS[name]

    def compile_w16():
        cs = compile_script(wl.script)
        return [parallelize(s.dfg, 16) for s in cs.steps if s.kind == "dfg"]

    tgs = benchmark(compile_w16)
    assert all(len(tg.nodes) > 0 for tg in tgs)
