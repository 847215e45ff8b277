"""Tab. 1 — Parallelizability classes of GNU Coreutils and POSIX (§3.1).

Usage: ``spark-submit jobs/table1_classes.py`` (no Spark computation is
needed; the session is created only for interface uniformity).
"""
from __future__ import annotations

from typing import Dict, List

from _common import get_spark, print_table


def run(spark=None) -> List[Dict]:
    from repro.annotations.study import PAPER_TABLE1, table1_rows

    paper = {cls: (cu, cup, px, pxp) for cls, cu, cup, px, pxp in PAPER_TABLE1}
    rows = []
    for r in table1_rows():
        cu, cup, px, pxp = paper[r["class"]]
        rows.append({
            "class": r["class"],
            "examples": r["examples"],
            "coreutils (paper)": f"{cu} ({cup}%)",
            "coreutils (ours)": f"{r['coreutils']} ({r['coreutils_pct']}%)",
            "posix (paper)": f"{px} ({pxp}%)",
            "posix (ours)": f"{r['posix']} ({r['posix_pct']}%)",
        })
    return rows


def main() -> None:
    print_table(run(), "Tab. 1 — Parallelizability classes")


if __name__ == "__main__":
    main()
