"""The synth_data extension: sparse tensors as Spark coordinate relations."""
from repro import synth_data


def test_sparse_matrix_relation(spark):
    df = synth_data.sparse_matrix(spark, sf=0.001, seed=1)
    assert set(df.columns) == {"i1", "i2", "v"}
    n = df.count()
    assert 500 <= n <= 2000  # ~1000 nnz at sf=0.001


def test_table2_analog_relation(spark):
    df = synth_data.table2_analog(spark, "pdb1HYS")
    assert set(df.columns) == {"i1", "i2", "v"}
    assert df.count() > 1000


def test_tpch_lite_still_works(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    assert li.count() > 1000
