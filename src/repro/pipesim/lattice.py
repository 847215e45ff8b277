"""The runtime-setup lattice of Fig. 9, evaluated in simulation.

Configurations (matching Fig. 10's four lines):

* ``pash``           — split + eager relays (the full system),
* ``no_split``       — eager relays, no split (width only from existing
  stream multiplicity),
* ``blocking_eager`` — no split; eager relays replaced by file-buffer +
  wait-for-EOF (Fig. 8c),
* ``no_eager``       — no split, no relays: bare bounded FIFOs (Fig. 8a).

Per-edge line volumes are calibrated by an instrumented sequential run of
the transformed DFG on the given (sample-scale) input, optionally scaled
up; node rates come from :data:`repro.pipesim.sim.RATES`. Speedups are
relative to the simulated sequential schedule of the untransformed graph.
"""
from __future__ import annotations

from typing import Dict, List, Optional

from repro.commands.base import ExecEnv
from repro.compiler.backend_seq import run_dfg_seq
from repro.compiler.frontend import compile_script
from repro.dfg.transform import parallelize

from .sim import sequential_time, sim_from_dfg, simulate

CONFIGS = ("pash", "no_split", "blocking_eager", "no_eager")


def _sim_one(g, env: ExecEnv, *, discipline: str, scale: float) -> float:
    volumes: Dict[int, int] = {}
    run_dfg_seq(g, _fresh(env), record=volumes)
    nodes, edges, _ = sim_from_dfg(g, volumes, edge_discipline=discipline, scale=scale)
    res = simulate(nodes, edges, pash_cleanup=True)
    assert not res.deadlocked, "transformed DFG deadlocked in simulation"
    return res.time


def _fresh(env: ExecEnv) -> ExecEnv:
    return ExecEnv(files=dict(env.files), ftypes=dict(env.ftypes))


def runtime_lattice(
    script: str,
    env: ExecEnv,
    *,
    widths: List[int],
    scale: float = 1.0,
    shell_env: Optional[Dict[str, str]] = None,
) -> Dict[str, Dict[int, float]]:
    """Simulated speedup over sequential for each runtime configuration."""
    cs = compile_script(script, shell_env)
    dfgs = [s.dfg for s in cs.steps if s.kind == "dfg"]
    assert len(dfgs) == 1, "runtime_lattice expects a single-region script"
    g = dfgs[0]

    base_vol: Dict[int, int] = {}
    run_dfg_seq(g, _fresh(env), record=base_vol)
    t_seq = sequential_time(g, base_vol, scale=scale)

    out: Dict[str, Dict[int, float]] = {c: {} for c in CONFIGS}
    for w in widths:
        variants = {
            "pash": (parallelize(g, w, enable_split=True, enable_eager=True), "eager"),
            "no_split": (parallelize(g, w, enable_split=False, enable_eager=True), "eager"),
            "blocking_eager": (parallelize(g, w, enable_split=False, enable_eager=True), "file"),
            "no_eager": (parallelize(g, w, enable_split=False, enable_eager=False), "eager"),
        }
        for name, (tg, disc) in variants.items():
            t = _sim_one(tg, env, discipline=disc, scale=scale)
            out[name][w] = t_seq / t if t > 0 else float("inf")
    return out
