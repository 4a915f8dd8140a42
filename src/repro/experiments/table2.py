"""Table 2 reproduction: the evaluation datasets.

The paper's SuiteSparse/FROSTT datasets are replaced by synthetic analogs
(same density and aspect ratio, dims scaled 1/20 — DESIGN.md Sec. 2);
this table reports the generated analogs next to the paper's originals.
"""
from __future__ import annotations

from repro.experiments.runners import print_table
from repro.synth_tensors import DEFAULT_SCALE, TABLE2, dataset_row


def rows(scale: float = DEFAULT_SCALE) -> list[dict]:
    out = []
    for name in TABLE2:
        r = dataset_row(name, scale)
        out.append(
            {
                "tensor": r.name,
                "dims": "x".join(str(d) for d in r.shape),
                "density": f"{r.density:.1e}",
                "nnz": r.nnz,
                "paper_dims": "x".join(
                    f"{d // 1000}K" if d >= 1000 else str(d)
                    for d in r.paper_shape
                ),
                "paper_density": f"{r.paper_density:.0e}",
                "paper_nnz": f"{r.paper_nnz / 1e6:.2f}M",
            }
        )
    return out


def main(scale: float = DEFAULT_SCALE) -> list[dict]:
    r = rows(scale)
    print_table("Table 2: datasets (synthetic analogs vs paper)", r)
    return r


if __name__ == "__main__":
    main()
