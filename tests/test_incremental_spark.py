"""Tests for Spark Correction Propagation (repro.core.incremental):
bit-equality against the reference incremental engine, and the
incremental-equals-scratch invariant on the Spark dataflow itself."""
import numpy as np
import pandas as pd
import pytest

from repro.core.incremental import apply_batch
from repro.core.resolve import resolve_labels
from repro.core.rslpa import run_static
from repro.reference.incremental_ref import ref_apply_batch, ref_run_static
from repro.reference.rslpa_ref import labels_long
from repro.webgraph.generator import edit_batch, web_graph

T_ITERS = 8
SEED = 5


def _sorted_labels(df):
    return (
        df.toPandas()
        .sort_values(["id", "t"])
        .reset_index(drop=True)
        .astype("int64")
    )


@pytest.fixture(scope="module")
def base(spark):
    pdf = web_graph(n=250, avg_degree=6, seed=1)
    st = run_static(spark.createDataFrame(pdf), T_ITERS, SEED)
    return st, pdf


class TestApplyBatch:
    def test_bit_identical_to_reference(self, spark, base):
        st, pdf = base
        ins, dele = edit_batch(pdf, 30, seed=9)
        st2, stats = apply_batch(
            st, spark.createDataFrame(ins), spark.createDataFrame(dele)
        )
        rst2, rstats = ref_apply_batch(
            ref_run_static(pdf, T_ITERS, SEED), ins, dele
        )
        pd.testing.assert_frame_equal(
            _sorted_labels(st2.labels),
            labels_long(rst2.g, rst2.labels)
            .sort_values(["id", "t"])
            .reset_index(drop=True)
            .astype("int64"),
        )
        assert stats.eta == rstats["eta"]
        assert stats.n_repicked == rstats["n_repicked"]
        assert stats.n_value_changed == rstats["n_value_changed"]
        assert stats.n_affected_vertices == rstats["n_affected_vertices"]

    def test_incremental_equals_scratch(self, spark, base):
        """The paper's headline claim as an exact invariant: the maintained
        label table equals a from-scratch resolution of the updated choice
        table, hence identical communities."""
        st, pdf = base
        ins, dele = edit_batch(pdf, 20, seed=4)
        st2, _ = apply_batch(
            st, spark.createDataFrame(ins), spark.createDataFrame(dele)
        )
        scratch = resolve_labels(st2.adjacency, st2.choices)
        pd.testing.assert_frame_equal(
            _sorted_labels(st2.labels), _sorted_labels(scratch)
        )

    def test_choice_row_count_invariant(self, spark, base):
        st, pdf = base
        ins, dele = edit_batch(pdf, 20, seed=4)
        st2, _ = apply_batch(
            st, spark.createDataFrame(ins), spark.createDataFrame(dele)
        )
        assert st2.choices.count() == st2.adjacency.count() * T_ITERS

    def test_empty_batch_is_noop(self, spark, base):
        st, _ = base
        st2, stats = apply_batch(st, None, None)
        assert stats.eta == 0 and stats.rounds == 0
        assert st2 is st

    def test_insert_only_batch(self, spark, base):
        st, pdf = base
        ins, _ = edit_batch(pdf, 20, seed=7)
        st2, stats = apply_batch(st, spark.createDataFrame(ins), None)
        assert stats.m_inserted == 10 and stats.m_deleted == 0
        scratch = resolve_labels(st2.adjacency, st2.choices)
        pd.testing.assert_frame_equal(
            _sorted_labels(st2.labels), _sorted_labels(scratch)
        )

    def test_delete_only_batch(self, spark, base):
        st, pdf = base
        _, dele = edit_batch(pdf, 20, seed=7)
        st2, stats = apply_batch(st, None, spark.createDataFrame(dele))
        assert stats.m_deleted == 10 and stats.m_inserted == 0
        scratch = resolve_labels(st2.adjacency, st2.choices)
        pd.testing.assert_frame_equal(
            _sorted_labels(st2.labels), _sorted_labels(scratch)
        )

    def test_epoch_advances(self, spark, base):
        st, pdf = base
        ins, dele = edit_batch(pdf, 10, seed=2)
        st2, _ = apply_batch(
            st, spark.createDataFrame(ins), spark.createDataFrame(dele)
        )
        assert st2.epoch == st.epoch + 1

    def test_new_vertex_insertion(self, spark, base):
        st, pdf = base
        new_id = int(max(pdf["dst"].max(), pdf["src"].max())) + 100
        ins = spark.createDataFrame(
            pd.DataFrame({"src": [new_id, new_id], "dst": [0, 1]})
        )
        st2, _ = apply_batch(st, ins, None)
        ids = {int(r["id"]) for r in st2.adjacency.select("id").collect()}
        assert new_id in ids
        scratch = resolve_labels(st2.adjacency, st2.choices)
        pd.testing.assert_frame_equal(
            _sorted_labels(st2.labels), _sorted_labels(scratch)
        )
