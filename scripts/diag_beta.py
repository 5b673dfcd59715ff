"""Diagnose false beta>=1 pairs in the micro profile with pure pandas."""
import sys

sys.path.insert(0, "/root/repo/src")
import numpy as np
import pandas as pd

from repro.kbgen.generator import generate_pandas
from repro.kbgen.profiles import MICRO

pdf1, pdf2, gt = generate_pandas(MICRO, seed=7)


def tokens(pdf):
    lits = pdf[pdf.val.notna()][["eid", "val"]].copy()
    lits["token"] = lits.val.str.lower().str.split(r"[^a-z0-9]+")
    t = lits.explode("token")[["eid", "token"]]
    t = t[t.token != ""].drop_duplicates()
    return t


t1, t2 = tokens(pdf1), tokens(pdf2)
ef1 = t1.groupby("token").size().rename("ef1")
ef2 = t2.groupby("token").size().rename("ef2")
w = pd.concat([ef1, ef2], axis=1).dropna()
w["comp"] = w.ef1 * w.ef2
w = w[w.comp <= 100]  # purge threshold from the run
w["weight"] = 1.0 / np.log2(w.comp + 1)

j = t1.merge(w.reset_index(), on="token").merge(
    t2, on="token", suffixes=("1", "2")
)
beta = j.groupby(["eid1", "eid2"]).weight.sum().reset_index(name="beta")
top = beta.sort_values("beta", ascending=False).groupby("eid1").head(1)
r2 = top[beta.columns].query("beta >= 1")
r2 = r2.merge(gt, how="left", indicator=True, on=["eid1", "eid2"])
print(r2.to_string())
false = r2[r2._merge == "left_only"]
for _, row in false.head(4).iterrows():
    sub = j[(j.eid1 == row.eid1) & (j.eid2 == row.eid2)]
    print(f"\npair ({row.eid1},{row.eid2}) beta={row.beta:.2f}")
    print(sub[["token", "ef1", "ef2", "weight"]].to_string())
