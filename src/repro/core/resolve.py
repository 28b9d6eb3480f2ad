"""Label resolution: from the choice table to the label table.

Algorithm 1's recurrence is ``l_i^0 = i`` and
``l_i^t = l_{src_i^t}^{pos_i^t}`` with ``pos < t``: every ``(i, t)`` chases a
pointer chain that strictly decreases in ``t`` and ends at an anchor
``(j, 0)`` whose label is ``j``. The label of ``(i, t)`` is therefore the
*root vertex id* of its chain.

On Spark we resolve all ``(T+1)·|V|`` labels at once by **pointer doubling**:
the state frame maps each ``(id, t)`` to the chain node ``(cid, ct)`` it
currently points at; one self-join squares the pointer function, so chains of
depth ``d`` collapse in ``⌈log2 d⌉ ≤ ⌈log2 T⌉`` join rounds — the Spark-native
form of the paper's T-round message loop (expected chain depth is only
``O(log t)`` because ``pos`` is uniform, so the loop usually exits early).

Every ``(cid, ct)`` key is guaranteed to exist as a state row: ``src`` is a
neighbor (degree ≥ 1, so it has rows for all t), ``pos < t ≤ T``, and anchors
``(j, 0) → (j, 0)`` are fixpoints. Hence the self-join is inner and lossless.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import choices as C


def resolve_labels(
    adjacency: DataFrame, choice_table: DataFrame, max_rounds: int = 64
) -> DataFrame:
    """Resolve the full label table ``(id, t, label)`` for ``t ∈ [0..T]``.

    ``adjacency`` supplies the anchors (degree ≥ 1 vertices);
    ``choice_table`` is the output of ``repro.core.choices.draw_choices``
    (or its incrementally-maintained successor).
    """
    state = (
        choice_table.select(
            "id", "t", F.col("src").alias("cid"), F.col("pos").alias("ct")
        )
        .unionByName(
            C.base_rows(adjacency).select(
                "id", "t", F.col("src").alias("cid"), F.col("pos").alias("ct")
            )
        )
        .localCheckpoint(eager=True)
    )
    for _ in range(max_rounds):
        pending = state.where(F.col("ct") > 0).limit(1).count()
        if pending == 0:
            break
        nxt = state.select(
            F.col("id").alias("jid"),
            F.col("t").alias("jt"),
            F.col("cid").alias("ncid"),
            F.col("ct").alias("nct"),
        )
        prev = state
        state = (
            state.join(
                nxt,
                (state["cid"] == nxt["jid"]) & (state["ct"] == nxt["jt"]),
                "inner",
            )
            .select(
                "id", "t", F.col("ncid").alias("cid"), F.col("nct").alias("ct")
            )
            .localCheckpoint(eager=True)
        )
        prev.unpersist()  # drop the superseded checkpoint's cached blocks
    else:  # pragma: no cover - max_rounds is far above log2(any feasible T)
        raise RuntimeError("pointer doubling did not converge")
    return state.select("id", "t", F.col("cid").alias("label"))
