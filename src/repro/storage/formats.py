"""Physical storage formats and their declarative storage mappings (Sec. 4).

Each ``build_*`` function lays a :class:`~repro.storage.coo.COO` tensor out
into physical data (NumPy arrays / nested dicts / scalars, the paper's
``CREATE ARRAY | HASHMAP | SCALAR``), and pairs it with:

* ``tsm_src``  — the SDQLite Tensor Storage Mapping, written exactly in the
  paper's concrete syntax (with the ``@unique`` annotations of Sec. 5.2
  that enable fusion rule F3);
* ``var_est``  — cost-model statistics for every physical symbol, including
  ``<arr>#segment`` entries giving average segment lengths of segmented
  arrays (Sec. 2);
* ``depths``   — dictionary depths of the physical symbols (for the
  scalar-guard analysis of rules A2/A3).

The paper's HASHMAP (DOK) and TRIE formats differ only in their physical
hash layout; in Python both are nested dicts, so we implement one ``hash``
format and model the flat-vs-trie distinction purely through the cost
model's gamma parameters (documented in DESIGN.md).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.cost import cardinality as C
from repro.cost.model import Est
from repro.storage.coo import COO, to_nested


@dataclass
class StoredTensor:
    """A logical tensor together with one physical representation."""

    name: str
    fmt: str
    coo: COO
    env: dict = field(default_factory=dict)  # physical symbol -> value
    tsm_src: str = ""
    var_est: dict = field(default_factory=dict)  # symbol -> Est
    depths: dict = field(default_factory=dict)  # symbol -> dict depth

    @property
    def shape(self):
        return self.coo.shape

    def logical(self):
        """The nested-dict logical value (ground truth for the oracle)."""
        return to_nested(self.coo)


def _arr(st: StoredTensor, sym: str, a: np.ndarray, kind="dense"):
    st.env[sym] = a
    st.var_est[sym] = Est(C.seq(len(a)), kind, src=sym)
    st.depths[sym] = 1


def _scal(st: StoredTensor, sym: str, v: int):
    st.env[sym] = int(v)
    st.var_est[sym] = Est(C.S, value=int(v))
    st.depths[sym] = 0


def _segment(st: StoredTensor, sym: str, avg_len: float):
    st.var_est[f"{sym}#segment"] = Est(C.seq(max(avg_len, 1e-9)))


# ---------------------------------------------------------------------------
# Matrix formats
# ---------------------------------------------------------------------------

def build_dense(name: str, coo: COO) -> StoredTensor:
    """Row-major dense array (paper Example 4.1)."""
    m, n = coo.shape
    st = StoredTensor(name, "dense", coo)
    _arr(st, f"{name}_V", coo.to_dense().reshape(-1))
    _scal(st, f"{name}_M", m)
    _scal(st, f"{name}_N", n)
    st.tsm_src = f"""
      sum(<i,_> in 0:{name}_M)
        {{ @unique i ->
           sum(<j,_> in 0:{name}_N)
             {{ @unique j -> {name}_V(i*{name}_N+j) }} }}
    """
    return st


def build_coo(name: str, coo: COO) -> StoredTensor:
    """Coordinate format: parallel idx/val arrays (Sec. 2)."""
    st = StoredTensor(name, "coo", coo)
    _arr(st, f"{name}_idx1", coo.coords[:, 0])
    _arr(st, f"{name}_idx2", coo.coords[:, 1])
    _arr(st, f"{name}_val", coo.vals)
    _scal(st, f"{name}_nnz", coo.nnz)
    st.tsm_src = f"""
      sum(<p,_> in 0:{name}_nnz)
        {{ {name}_idx1(p) -> {{ {name}_idx2(p) -> {name}_val(p) }} }}
    """
    return st


def _csr_arrays(coo: COO):
    m, _ = coo.shape
    counts = np.zeros(m, dtype=np.int64)
    np.add.at(counts, coo.coords[:, 0], 1)
    pos2 = np.zeros(m + 1, dtype=np.int64)
    np.cumsum(counts, out=pos2[1:])
    return pos2, coo.coords[:, 1].copy(), coo.vals.copy()


def build_csr(name: str, coo: COO) -> StoredTensor:
    """Compressed Sparse Row: dense rows, sparse columns (Fig. 1(b,c))."""
    m, _ = coo.shape
    pos2, idx2, val = _csr_arrays(coo)
    st = StoredTensor(name, "csr", coo)
    _scal(st, f"{name}_len1", m)
    _arr(st, f"{name}_pos2", pos2)
    _arr(st, f"{name}_idx2", idx2)
    _arr(st, f"{name}_val", val)
    _segment(st, f"{name}_idx2", coo.nnz / max(m, 1))
    st.tsm_src = f"""
      sum(<row,_> in 0:{name}_len1)
        {{ @unique row ->
           sum(<off,col> in {name}_idx2( {name}_pos2(row):{name}_pos2(row+1) ))
             {{ @unique col -> {name}_val(off) }} }}
    """
    return st


def build_csc(name: str, coo: COO) -> StoredTensor:
    """Compressed Sparse Column. The logical tensor is still (i, j); the
    nesting {row -> {col -> v}} cannot carry @unique here because the same
    row re-appears across columns — exactly why row-major access over CSC
    does not fuse (and the cost model knows it)."""
    t = coo.transpose()  # (col, row) sorted by col
    n, m = t.shape
    pos1, idx1, val = _csr_arrays(t)
    st = StoredTensor(name, "csc", coo)
    _scal(st, f"{name}_len2", n)
    _arr(st, f"{name}_pos1", pos1)
    _arr(st, f"{name}_idx1", idx1)
    _arr(st, f"{name}_val", val)
    _segment(st, f"{name}_idx1", coo.nnz / max(n, 1))
    st.tsm_src = f"""
      sum(<col,_> in 0:{name}_len2)
        sum(<off,row> in {name}_idx1( {name}_pos1(col):{name}_pos1(col+1) ))
          {{ row -> {{ col -> {name}_val(off) }} }}
    """
    return st


def build_dcsr(name: str, coo: COO) -> StoredTensor:
    """Doubly-compressed sparse row: sparse rows, sparse columns
    (paper Example 4.2)."""
    rows, first = np.unique(coo.coords[:, 0], return_index=True)
    pos2 = np.append(first, coo.nnz).astype(np.int64)
    st = StoredTensor(name, "dcsr", coo)
    _arr(st, f"{name}_pos1", np.array([0, len(rows)], dtype=np.int64))
    _arr(st, f"{name}_idx1", rows)
    _arr(st, f"{name}_pos2", pos2)
    _arr(st, f"{name}_idx2", coo.coords[:, 1].copy())
    _arr(st, f"{name}_val", coo.vals.copy())
    _segment(st, f"{name}_idx2", coo.nnz / max(len(rows), 1))
    st.tsm_src = f"""
      sum(<i_pos,i> in {name}_idx1)
        {{ @unique i ->
           sum(<j_pos,j> in {name}_idx2( {name}_pos2(i_pos):{name}_pos2(i_pos+1) ))
             {{ @unique j -> {name}_val(j_pos) }} }}
    """
    return st


def build_hash(name: str, coo: COO) -> StoredTensor:
    """Hash-map storage (paper Example 4.3: DOK / trie): a nested dict."""
    st = StoredTensor(name, "hash", coo)
    nested = to_nested(coo)
    st.env[f"{name}_H"] = nested
    rows = max(len(nested), 1)
    st.var_est[f"{name}_H"] = Est(
        C.seq(rows, C.seq(coo.nnz / rows)), "hash", src=f"{name}_H"
    )
    st.depths[f"{name}_H"] = coo.rank
    if coo.rank == 2:
        st.tsm_src = f"""
          sum(<i,row> in {name}_H)
            {{ @unique i -> sum(<j,v> in row) {{ @unique j -> v }} }}
        """
    elif coo.rank == 3:
        st.var_est[f"{name}_H"] = Est(
            C.seq(rows, C.seq(max(1.0, (coo.nnz / rows) ** 0.5),
                              C.seq(max(1.0, (coo.nnz / rows) ** 0.5)))),
            "hash", src=f"{name}_H",
        )
        st.tsm_src = f"""
          sum(<i,fib> in {name}_H)
            {{ @unique i ->
               sum(<j,row> in fib)
                 {{ @unique j -> sum(<k,v> in row) {{ @unique k -> v }} }} }}
        """
    else:
        st.tsm_src = f"sum(<i,v> in {name}_H) {{ @unique i -> v }}"
    return st


# ---------------------------------------------------------------------------
# Rank-3 tensor formats
# ---------------------------------------------------------------------------

def build_csf(name: str, coo: COO) -> StoredTensor:
    """Compressed Sparse Fiber: the rank-3 analog of DCSR (used by Taco for
    TTM / MTTKRP)."""
    assert coo.rank == 3
    c = coo.coords
    # level 1: unique i
    i_vals, i_first = np.unique(c[:, 0], return_index=True)
    # level 2: unique (i, j) pairs
    ij_keys = c[:, 0] * (coo.shape[1] + 1) + c[:, 1]
    ij_vals, ij_first = np.unique(ij_keys, return_index=True)
    pos2 = np.searchsorted(ij_first, i_first)
    pos2 = np.append(pos2, len(ij_vals)).astype(np.int64)
    idx2 = c[ij_first, 1]
    pos3 = np.append(ij_first, coo.nnz).astype(np.int64)
    idx3 = c[:, 2].copy()
    st = StoredTensor(name, "csf", coo)
    _arr(st, f"{name}_idx1", i_vals)
    _arr(st, f"{name}_pos2", pos2)
    _arr(st, f"{name}_idx2", idx2)
    _arr(st, f"{name}_pos3", pos3)
    _arr(st, f"{name}_idx3", idx3)
    _arr(st, f"{name}_val", coo.vals.copy())
    _segment(st, f"{name}_idx2", len(ij_vals) / max(len(i_vals), 1))
    _segment(st, f"{name}_idx3", coo.nnz / max(len(ij_vals), 1))
    st.tsm_src = f"""
      sum(<p1,i> in {name}_idx1)
        {{ @unique i ->
           sum(<p2,j> in {name}_idx2( {name}_pos2(p1):{name}_pos2(p1+1) ))
             {{ @unique j ->
                sum(<p3,k> in {name}_idx3( {name}_pos3(p2):{name}_pos3(p2+1) ))
                  {{ @unique k -> {name}_val(p3) }} }} }}
    """
    return st


def build_coo3(name: str, coo: COO) -> StoredTensor:
    """Rank-3 coordinate format."""
    st = StoredTensor(name, "coo", coo)
    _arr(st, f"{name}_idx1", coo.coords[:, 0])
    _arr(st, f"{name}_idx2", coo.coords[:, 1])
    _arr(st, f"{name}_idx3", coo.coords[:, 2])
    _arr(st, f"{name}_val", coo.vals)
    _scal(st, f"{name}_nnz", coo.nnz)
    st.tsm_src = f"""
      sum(<p,_> in 0:{name}_nnz)
        {{ {name}_idx1(p) ->
           {{ {name}_idx2(p) -> {{ {name}_idx3(p) -> {name}_val(p) }} }} }}
    """
    return st


# ---------------------------------------------------------------------------
# Vector formats
# ---------------------------------------------------------------------------

def build_densev(name: str, coo: COO) -> StoredTensor:
    st = StoredTensor(name, "dense", coo)
    _arr(st, f"{name}_V", coo.to_dense())
    st.tsm_src = f"sum(<i,v> in {name}_V) {{ @unique i -> v }}"
    return st


def build_sparsev(name: str, coo: COO) -> StoredTensor:
    st = StoredTensor(name, "sparse", coo)
    _arr(st, f"{name}_idx", coo.coords[:, 0])
    _arr(st, f"{name}_val", coo.vals)
    st.tsm_src = (
        f"sum(<p,i> in {name}_idx) {{ @unique i -> {name}_val(p) }}"
    )
    return st


def build_hashv(name: str, coo: COO) -> StoredTensor:
    st = StoredTensor(name, "hash", coo)
    st.env[f"{name}_H"] = to_nested(coo)
    st.var_est[f"{name}_H"] = Est(C.seq(coo.nnz), "hash", src=f"{name}_H")
    st.depths[f"{name}_H"] = 1
    st.tsm_src = f"sum(<i,v> in {name}_H) {{ @unique i -> v }}"
    return st


# ---------------------------------------------------------------------------
# Beyond fixed formats (paper Sec. 4 closing examples)
# ---------------------------------------------------------------------------

def build_lower_triangular(name: str, coo: COO) -> StoredTensor:
    """Dense lower-triangular storage: row i holds i+1 packed values."""
    n = coo.shape[0]
    dense = coo.to_dense()
    packed = np.concatenate([dense[i, : i + 1] for i in range(n)])
    st = StoredTensor(name, "lowertri", coo)
    _arr(st, f"{name}_val", packed)
    _scal(st, f"{name}_N", n)
    st.tsm_src = f"""
      sum(<i,_> in 0:{name}_N)
        {{ @unique i ->
           sum(<j,_> in 0:(i+1))
             {{ @unique j -> {name}_val(i*(i+1)/2+j) }} }}
    """
    return st


def build_band(name: str, coo: COO) -> StoredTensor:
    """Tri-diagonal band storage: 3N-2 packed values."""
    n = coo.shape[0]
    dense = coo.to_dense()
    val = np.zeros(3 * n - 2)
    for p in range(n):
        val[3 * p] = dense[p, p]
        if p + 1 < n:
            val[3 * p + 1] = dense[p, p + 1]
            val[3 * p + 2] = dense[p + 1, p]
    st = StoredTensor(name, "band", coo)
    _arr(st, f"{name}_val", val)
    _scal(st, f"{name}_N", n)
    st.tsm_src = f"""
      sum(<p,_> in 0:{name}_N)
        {{ (p,p) -> {name}_val(3*p) }} +
        if (p+1 < {name}_N)
          then {{ (p,p+1) -> {name}_val(3*p+1),
                  (p+1,p) -> {name}_val(3*p+2) }}
    """
    return st


def build_zorder(name: str, coo: COO) -> StoredTensor:
    """Z-order (Morton) space-filling-curve storage; N must be a power of 2."""
    n = coo.shape[0]
    assert n & (n - 1) == 0, "Z-order needs a power-of-two dimension"
    dense = coo.to_dense()
    val = np.zeros(n * n)
    for d in range(n * n):
        i = _even_bits(d)
        j = _odd_bits(d)
        val[d] = dense[i, j]
    st = StoredTensor(name, "zorder", coo)
    _arr(st, f"{name}_val", val)
    st.tsm_src = f"""
      sum(<d,v> in {name}_val)
        let i = even_bits(d), j = odd_bits(d)
        in {{ (i,j) -> v }}
    """
    return st


def _even_bits(d: int) -> int:
    out = bit = 0
    while d:
        out |= (d & 1) << bit
        d >>= 2
        bit += 1
    return out


def _odd_bits(d: int) -> int:
    return _even_bits(d >> 1)


MATRIX_FORMATS = {
    "dense": build_dense,
    "coo": build_coo,
    "csr": build_csr,
    "csc": build_csc,
    "dcsr": build_dcsr,
    "hash": build_hash,
    "lowertri": build_lower_triangular,
    "band": build_band,
    "zorder": build_zorder,
}

TENSOR3_FORMATS = {
    "csf": build_csf,
    "coo": build_coo3,
    "hash": build_hash,
}

VECTOR_FORMATS = {
    "dense": build_densev,
    "sparse": build_sparsev,
    "hash": build_hashv,
}


def store(name: str, coo: COO, fmt: str) -> StoredTensor:
    """Store tensor ``name`` (given as COO) in format ``fmt``."""
    table = {1: VECTOR_FORMATS, 2: MATRIX_FORMATS, 3: TENSOR3_FORMATS}[
        coo.rank
    ]
    return table[fmt](name, coo)
