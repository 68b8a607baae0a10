"""P2 — paper Fig. 5(a): topic-related ER accuracy (F-score) per dataset."""
import pandas as pd

from repro.bench.harness import print_rows, run_table


def test_p2_fscore(spark, benchmark):
    rows = benchmark.pedantic(
        lambda: run_table(spark, "P2"), rounds=1, iterations=1
    )
    print_rows(rows)
    df = pd.DataFrame(rows)
    by = df.pivot_table(index="dataset", columns="method", values="f")
    # Fig. 5(a) shape: TER-iDS lands in the paper's accuracy band
    # (94.62-97.34%) and never trails the DD / editing-rule imputations.
    # At the default missing rate (xi=0.1) the window-mode con+ER baseline is
    # occasionally competitive on this synthetic substrate (see
    # EXPERIMENTS.md); its collapse shows up under imputation stress (P11).
    for dsname, r in by.iterrows():
        assert r["ter"] >= 0.90, (dsname, dict(r))
        assert r["ter"] >= r["dd_er"] - 1e-9, (dsname, dict(r))
        assert r["ter"] >= r["er_er"] - 1e-9, (dsname, dict(r))
