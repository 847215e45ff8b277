"""§6.3 — NOAA weather analysis (the paper's Fig. 2 running example).

Measures the full pipeline plus the preprocessing (download/extract) and
processing (max computation) phases separately — the paper's 2.52x /
2.04x / 12.31x decomposition.

Usage: ``spark-submit jobs/noaa.py [scale] [width]``
"""
from __future__ import annotations

import sys
from typing import Dict, List

from _common import get_spark, print_table


def run(spark, *, scale: float = 1.0, width: int = 16) -> List[Dict]:
    from repro.commands.base import ExecEnv
    from repro.workloads import noaa
    from repro.workloads.harness import measure_seq, measure_spark

    rows: List[Dict] = []
    base_env = noaa.make_env(scale)

    def fresh():
        return ExecEnv(files=dict(base_env.files), ftypes=dict(base_env.ftypes))

    # preprocessing writes temps_<y>.txt into its env; compute reads them —
    # run each phase from a fresh env so timings do not interact
    from repro.compiler import pash_seq, pash_spark
    import time

    phases = [("full", noaa.FULL, None), ("preprocessing", noaa.PREPROC, None)]
    # compute phase needs the preprocessed files present
    pre_env = fresh()
    pash_seq(noaa.PREPROC, pre_env)
    phases.append(("processing", noaa.COMPUTE, pre_env))

    for name, script, env0 in phases:
        env_s = ExecEnv(files=dict((env0 or base_env).files),
                        ftypes=dict((env0 or base_env).ftypes))
        t0 = time.perf_counter()
        seq_out = pash_seq(script, env_s)
        t_seq = time.perf_counter() - t0
        env_p = ExecEnv(files=dict((env0 or base_env).files),
                        ftypes=dict((env0 or base_env).ftypes))
        t0 = time.perf_counter()
        par_out = pash_spark(spark, script, env_p, width=width)
        t_par = time.perf_counter() - t0
        assert par_out == seq_out, name
        rows.append({
            "phase": name,
            "seq": f"{t_seq:.2f}s",
            f"pash_w{width}": f"{t_par:.2f}s",
            "speedup": f"{t_seq / t_par:.2f}x",
        })
    return rows


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    width = int(sys.argv[2]) if len(sys.argv) > 2 else 16
    spark = get_spark("noaa")
    spark.sparkContext.setLogLevel("ERROR")
    print_table(run(spark, scale=scale, width=width), f"NOAA (width={width})")
    spark.stop()


if __name__ == "__main__":
    main()
