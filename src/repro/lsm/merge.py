"""LSM merge machinery (paper §4.5.3).

``pick_merge`` implements the tiering policy used in the evaluation
(size ratio 1.2, max 5 tolerable components, §6.3).

Columnar components merge *vertically*: primary keys merge first and
record the sequence of (component, record) survivors; each column is then
stitched in that order — one column at a time, so the number of memory
regions touched is #components, not #components x #columns.  The stitch is
a fully vectorized ragged gather over per-record stream slices.
"""
from __future__ import annotations

from typing import Optional, Sequence

import numpy as np

from ..dremel.schema import ColumnInfo
from ..dremel.shred import ColumnData, ShreddedBatch


def pick_merge(
    sizes: Sequence[int], ratio: float = 1.2, max_components: int = 5
) -> Optional[list[int]]:
    """Indices (newest-first) of the component run to merge, or None.

    Merges the longest newest-first prefix whose younger components' total
    size reaches ``ratio`` x the prefix's oldest member; if none qualifies
    but the component count exceeds ``max_components``, everything merges.
    """
    best = None
    acc = 0
    for j in range(1, len(sizes)):
        acc += sizes[j - 1]
        if acc >= ratio * sizes[j]:
            best = j
    if best is not None:
        return list(range(best + 1))
    if len(sizes) > max_components:
        return list(range(len(sizes)))
    return None


def split_positions(defs, info: ColumnInfo) -> tuple[np.ndarray, np.ndarray]:
    """Record boundaries of a decoded def stream: (def_pos, val_pos).

    Runs the same automaton as assembly but only counts — this is what
    lets the vertical merge slice records without assembling them.
    """
    defs = np.asarray(defs)
    n = len(defs)
    maxd = info.max_def
    levels = info.array_levels
    k = len(levels)
    if k == 0:
        def_pos = np.arange(n + 1, dtype=np.int64)
        val_pos = np.concatenate(
            ([0], np.cumsum(defs == maxd, dtype=np.int64))
        )
        return def_pos, val_pos
    maxdelim = k - 1
    L0 = levels[0]
    def_pos = [0]
    val_pos = [0]
    vals = 0
    i = 0
    dl = defs.tolist()  # python ints: ~5x faster in the scalar loop
    while i < n:
        d = dl[i]
        i += 1
        if d < L0:
            def_pos.append(i)
            val_pos.append(vals)
            continue
        depth = 0
        for lv in levels:
            if lv <= d:
                depth += 1
            else:
                break
        if d == maxd:
            vals += 1
        fresh = False
        while True:
            d = dl[i]
            i += 1
            if fresh or d > maxdelim or d >= depth:
                t = 0
                for lv in levels:
                    if lv <= d:
                        t += 1
                    else:
                        break
                depth = t
                if d == maxd:
                    vals += 1
                fresh = False
            else:
                if d == 0:
                    break
                depth = d
                fresh = True
        def_pos.append(i)
        val_pos.append(vals)
    return np.asarray(def_pos, dtype=np.int64), np.asarray(val_pos, dtype=np.int64)


def merge_pk_sequence(
    pk_arrays: list[np.ndarray],
    def_arrays: list[np.ndarray],
    drop_antimatter: bool,
) -> tuple[np.ndarray, np.ndarray, np.ndarray, np.ndarray]:
    """Merge primary keys of components (index 0 = newest).

    Returns (comp_idx, rec_idx, pks, defs) of survivors in key order:
    per duplicated key only the newest component's entry survives;
    anti-matter entries are dropped when ``drop_antimatter`` (bottom
    merge) and their key's older versions are annihilated either way.
    """
    comp = np.concatenate(
        [np.full(len(a), i, dtype=np.int32) for i, a in enumerate(pk_arrays)]
    )
    rec = np.concatenate(
        [np.arange(len(a), dtype=np.int64) for a in pk_arrays]
    )
    pks = np.concatenate([np.asarray(a, dtype=np.int64) for a in pk_arrays])
    dfs = np.concatenate(
        [np.asarray(a, dtype=np.int64) for a in def_arrays]
    )
    order = np.lexsort((comp, pks))  # by key, then newest (smallest) first
    pks_s = pks[order]
    keep_first = np.concatenate(([True], pks_s[1:] != pks_s[:-1]))
    sel = order[keep_first]
    if drop_antimatter:
        alive = dfs[sel] == 1
        sel = sel[alive]
    return comp[sel], rec[sel], pks[sel], dfs[sel]


def ragged_gather(stream, starts: np.ndarray, lens: np.ndarray):
    """Concatenate ``stream[starts[i] : starts[i]+lens[i]]`` for all i —
    vectorized (no per-record Python slicing)."""
    total = int(lens.sum())
    if total == 0:
        return stream[:0]
    shift = np.concatenate(([0], np.cumsum(lens)[:-1]))
    idx = np.repeat(starts - shift, lens) + np.arange(total, dtype=np.int64)
    return stream[idx]


def stitch_column(
    per_comp: list[tuple[np.ndarray, list, np.ndarray, np.ndarray]],
    comp_idx: np.ndarray,
    rec_idx: np.ndarray,
    info: ColumnInfo,
) -> ColumnData:
    """Vertical-merge one column.

    ``per_comp[i] = (defs, values, def_pos, val_pos)`` for component ``i``
    (all-null columns may pass empty streams).  Survivor order comes from
    the PK merge (``comp_idx``/``rec_idx``).
    """
    n_out = len(comp_idx)
    # global bases so one gather serves all components
    def_base = np.zeros(len(per_comp) + 1, dtype=np.int64)
    val_base = np.zeros(len(per_comp) + 1, dtype=np.int64)
    for i, (d, v, _dp, _vp) in enumerate(per_comp):
        def_base[i + 1] = def_base[i] + len(d)
        val_base[i + 1] = val_base[i] + len(v)
    all_defs = np.concatenate([np.asarray(d, dtype=np.int64) for d, *_ in per_comp])
    all_vals = np.concatenate(
        [np.asarray(v, dtype=object) for _d, v, *_ in per_comp]
    ) if val_base[-1] else np.empty(0, dtype=object)

    dstarts = np.empty(n_out, dtype=np.int64)
    dlens = np.empty(n_out, dtype=np.int64)
    vstarts = np.empty(n_out, dtype=np.int64)
    vlens = np.empty(n_out, dtype=np.int64)
    for i, (_d, _v, dp, vp) in enumerate(per_comp):
        mask = comp_idx == i
        r = rec_idx[mask]
        dstarts[mask] = dp[r] + def_base[i]
        dlens[mask] = dp[r + 1] - dp[r]
        vstarts[mask] = vp[r] + val_base[i]
        vlens[mask] = vp[r + 1] - vp[r]
    out_defs = ragged_gather(all_defs, dstarts, dlens)
    out_vals = ragged_gather(all_vals, vstarts, vlens)
    def_pos = np.concatenate(([0], np.cumsum(dlens)))
    val_pos = np.concatenate(([0], np.cumsum(vlens)))
    return ColumnData(info, out_defs, list(out_vals), def_pos, val_pos)
