"""Tensor storage: COO containers, physical formats, and the declarative
Tensor Storage Mappings of paper Sec. 4."""
from repro.storage.coo import COO, from_dense, random_sparse, to_nested  # noqa: F401
from repro.storage.formats import (  # noqa: F401
    MATRIX_FORMATS, TENSOR3_FORMATS, VECTOR_FORMATS, StoredTensor, store,
)
