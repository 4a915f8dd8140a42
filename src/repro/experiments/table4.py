"""Table 4 reproduction: compilation metrics of the rewrite engine.

Two rows per kernel — the two optimization stages of Sec. 6.4 (storage-
independent, then storage-aware) — reporting the same metrics Egg does:
time (ms), iterations, e-nodes, e-classes, memos. The paper's absolute
numbers (Rust) are shown alongside; ours come from the Python EQSAT
engine, so the *relative* shape (BATAX largest, ΣMMM stage-1 trivial) is
the reproduction target.
"""
from __future__ import annotations

from repro.core.compile import Limits
from repro.experiments.runners import prepare_storel, print_table
from repro.experiments.table3 import make_data

# paper Table 4: kernel -> [(time_ms, iters, nodes, classes, memos), x2]
PAPER_TABLE4 = {
    "BATAX": [(445, 31, 47441, 30810, 51508), (1212, 59, 46456, 8043, 59010)],
    "SumMMM": [(1, 6, 42, 25, 42), (52, 22, 2077, 530, 2698)],
    "MTTKRP": [(10, 18, 571, 135, 821), (239, 35, 8414, 1130, 10700)],
    "MMM": [(10, 11, 910, 123, 1242), (1708, 61, 33058, 6479, 43407)],
    "TTM": [(11, 12, 1173, 140, 1480), (891, 61, 15891, 3244, 23981)],
}

FMTS = {
    "MMM": {"A": "csr", "B": "csr"},
    "SumMMM": {"A": "csc", "B": "csr"},
    "BATAX": {"A": "csr", "x": "dense"},
    "TTM": {"A": "csf", "B": "csc"},
    "MTTKRP": {"B": "csf", "C": "csr", "D": "csc"},
}

LIMITS = Limits(max_iters=12, max_nodes=20_000, timeout_s=10)


def rows(n: int = 200) -> list[dict]:
    out = []
    for kname in ("BATAX", "SumMMM", "MTTKRP", "MMM", "TTM"):
        coos, scalars = make_data(kname, n)
        p = prepare_storel(
            kname, coos, FMTS[kname], scalars or None, limits=LIMITS
        )
        for stage, (s, paper) in enumerate(
            zip(p.compiled.stage_stats, PAPER_TABLE4[kname]), start=1
        ):
            t, it, nodes, classes, memos = s.row()
            out.append({
                "kernel": kname, "stage": stage,
                "time_ms": t, "iters": it, "nodes": nodes,
                "classes": classes, "memos": memos,
                "paper": f"{paper[0]}ms/{paper[1]}it/{paper[2]}n"
                         f"/{paper[3]}c/{paper[4]}m",
            })
    return out


def main(n: int = 200) -> list[dict]:
    r = rows(n)
    print_table("Table 4: rewrite-engine compilation metrics", r)
    return r


if __name__ == "__main__":
    main()
