"""Tab. 2 — Summary of the §6.1 one-liners.

Per script: class structure (from our annotations), input size, sequential
time, transformed-DFG node counts at width 16 and 64, compile time.
``--scale`` shrinks/grows inputs (1.0 ~= seconds-long sequential runs).

Usage: ``spark-submit jobs/table2_oneliners.py [scale]``
"""
from __future__ import annotations

import sys
import time
from typing import Dict, List

from _common import get_spark, print_table


def run(spark=None, *, scale: float = 1.0, names=None) -> List[Dict]:
    from repro.commands.base import ExecEnv
    from repro.compiler import compile_script
    from repro.compiler.backend_seq import run_seq
    from repro.dfg.transform import parallelize
    from repro.workloads import ONELINERS

    rows: List[Dict] = []
    for name, wl in ONELINERS.items():
        if names and name not in names:
            continue
        env = wl.make_env(scale)
        input_bytes = sum(
            len(l) + 1 for f in env.files.values() for l in f
        )

        t0 = time.perf_counter()
        cs = compile_script(wl.script)
        t_frontend = time.perf_counter() - t0
        dfgs = [s.dfg for s in cs.steps if s.kind == "dfg"]
        structure = {}
        for g in dfgs:
            for k, v in g.class_structure().items():
                structure[k] = structure.get(k, 0) + v

        counts, ctimes = {}, {}
        for w in (16, 64):
            t0 = time.perf_counter()
            tgs = [parallelize(g, w) for g in dfgs]
            ctimes[w] = t_frontend + time.perf_counter() - t0
            counts[w] = sum(len(tg.nodes) for tg in tgs)

        t0 = time.perf_counter()
        run_seq(cs, ExecEnv(files=dict(env.files), ftypes=dict(env.ftypes)))
        t_seq = time.perf_counter() - t0

        rows.append({
            "script": name,
            "structure": " ".join(f"{v}x({k})" for k, v in sorted(structure.items())),
            "input": f"{input_bytes / 1e6:.1f}MB",
            "seq_time": f"{t_seq:.2f}s",
            "nodes_w16": counts[16],
            "nodes_w64": counts[64],
            "compile_w16": f"{ctimes[16] * 1000:.1f}ms",
            "compile_w64": f"{ctimes[64] * 1000:.1f}ms",
            "highlights": wl.highlights,
        })
    return rows


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    print_table(run(scale=scale), f"Tab. 2 — one-liners (scale={scale})")


if __name__ == "__main__":
    main()
