"""Display backend: emit the transformed DFG as a Fig. 3-style shell script.

PaSh's real backend emits exactly such a script and hands it to the user's
shell; here the emitted text is documentation/debugging output (our
execution substrate is Spark), but it makes the transformation's process
structure — named pipes, parallel lanes, eager/split runtime primitives,
and the wait-then-SIGPIPE cleanup epilogue of §5 — directly inspectable.
"""
from __future__ import annotations

from typing import Dict, List

from repro.dfg.graph import DFG


def emit_script(g: DFG) -> str:
    """Render a transformed DFG as a POSIX-ish shell script fragment."""
    pipes = [e for e in g.edges.values() if e.kind == "pipe" and e.src is not None]
    name: Dict[int, str] = {}
    for i, e in enumerate(sorted(p.eid for p in pipes)):
        name[e] = f"$t{i}"

    def edge_in(eid: int) -> str:
        e = g.edges[eid]
        if eid in name:
            return name[eid]
        if e.chunk is not None:
            k, w = e.chunk
            return f"{e.label}[{k}/{w}]"
        return e.label or "/dev/stdin"

    def edge_out(eid: int) -> str:
        e = g.edges[eid]
        if eid in name:
            return name[eid]
        return e.label or "/dev/stdout"

    lines: List[str] = []
    if name:
        lines.append("mkfifo " + " ".join(name[e].lstrip("$") for e in sorted(name)))
    for nid in g.topo_order():
        n = g.nodes[nid]
        srcs = " ".join(edge_in(e) for e in n.inputs)
        if n.kind == "cat":
            cmd = f"cat {srcs}"
        elif n.kind == "split":
            outs = " ".join(edge_out(e) for e in n.outputs)
            lines.append(f"cat {srcs} | split {outs} &")
            continue
        elif n.kind in ("eager", "relay"):
            cmd = f"cat {srcs} | {n.cmd}"
        elif n.kind == "agg":
            cmd = f"{n.cmd} {srcs}"
            srcs = ""
        else:
            argv = " ".join(n.argv)
            statics = ""  # static operands are already inside argv
            if n.via_stdin or not n.resolved or "stdin" in n.resolved.inputs:
                cmd = f"cat {srcs} | {n.cmd} {argv}".rstrip()
            else:
                cmd = f"{n.cmd} {argv}".rstrip()
        out = edge_out(n.outputs[0]) if n.outputs else "/dev/null"
        lines.append(f"{cmd} > {out} &")
    lines.append("wait $! && get-pids | xargs -n 1 kill -SIGPIPE")
    return "\n".join(lines)
