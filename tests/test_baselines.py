"""Exact ER Spark kernel vs the pure-python Eq. (2) reference."""
import numpy as np
import pandas as pd
import pytest

from repro.core.instances import build_imputed_tuple
from repro.core.probability import pr_ter_ids
from repro.streams.stream_gen import D
from repro.ter.baselines import exact_er_spark, instances_frame

KW = ["topic00"]
PIV = [frozenset({"p"})] * D


def _pop(seed=3, n=14):
    rng = np.random.default_rng(seed)
    vocab = [f"t{i}" for i in range(25)]
    out = []
    for rid in range(n):
        attrs = [" ".join(rng.choice(vocab, size=4, replace=False)) for _ in range(D)]
        if rid % 3 == 0:
            attrs[0] += " topic00"
        if rid % 4 == 0:
            alt = list(attrs)
            alt[1] = " ".join(rng.choice(vocab, size=3, replace=False))
            cands = [(tuple(attrs), 0.7), (tuple(alt), 0.3)]
        else:
            cands = [(tuple(attrs), 1.0)]
        # plant near-duplicates across streams
        if rid % 2 == 1:
            prev = out[rid - 1]
            cands = [
                (tuple(v + " x" if k == 2 else v for k, v in enumerate(a)), p)
                for a, p in prev_cands
            ]
        out.append(build_imputed_tuple(rid, rid % 2, cands, topics=KW, pivot_tokens=PIV))
        prev_cands = cands
    return out


class TestInstancesFrame:
    def test_flatten(self):
        pop = _pop()
        df = instances_frame(pop)
        assert len(df) == sum(len(t.instances) for t in pop)
        assert set(df.columns) == {"rid", "stream_id", "p", "has_kw"} | {
            f"v{k}" for k in range(D)
        }

    def test_probabilities_preserved(self):
        pop = _pop()
        df = instances_frame(pop)
        sums = df.groupby("rid")["p"].sum()
        assert np.allclose(sums.to_numpy(), 1.0)


class TestExactErSpark:
    @pytest.mark.parametrize("gamma,alpha", [(2.5, 0.5), (1.5, 0.1), (3.5, 0.8)])
    def test_matches_python_reference(self, spark, gamma, alpha):
        pop = _pop()
        new, win = pop[:6], pop[6:]
        got = exact_er_spark(
            spark, instances_frame(new), instances_frame(win),
            gamma=gamma, alpha=alpha,
        )
        got_pairs = {
            frozenset((int(r.rid_n), int(r.rid_m))): r.pr
            for r in got.itertuples(index=False)
        }
        want = {}
        for a in new:
            for b in win:
                if a.stream_id == b.stream_id:
                    continue
                pr = pr_ter_ids(a.instances, b.instances, gamma)
                if pr > alpha:
                    want[frozenset((a.rid, b.rid))] = pr
        assert set(got_pairs) == set(want)
        for k in want:
            assert got_pairs[k] == pytest.approx(want[k])

    def test_same_batch_dedupe(self, spark):
        pop = _pop()
        new = pop[:6]
        pool = instances_frame(new)
        got = exact_er_spark(
            spark, instances_frame(new), pool, gamma=1.0, alpha=0.0
        )
        pairs = [frozenset((int(r.rid_n), int(r.rid_m))) for r in got.itertuples(index=False)]
        assert len(pairs) == len(set(pairs))   # each unordered pair once
        for r in got.itertuples(index=False):
            assert r.rid_m < r.rid_n

    def test_empty_inputs(self, spark):
        pop = _pop()
        empty = instances_frame([])
        full = instances_frame(pop)
        assert exact_er_spark(spark, empty, full, gamma=1, alpha=0).empty
        assert exact_er_spark(spark, full, empty, gamma=1, alpha=0).empty
