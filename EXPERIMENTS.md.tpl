# EXPERIMENTS — paper vs measured

Every table below reproduces the underlying numbers of one figure of
the paper's evaluation (Section 6 / Appendix C). "Paper" rows quote the
published result; "Measured" blocks are the output of the
corresponding `benchmarks/bench_t*.py` harness on this container
(16 cores, Spark 4.1 `local[*]`, shuffle partitions 8), persisted in
`results/t*.json`. Regenerate any table with
`pytest benchmarks/bench_t<n>_*.py --benchmark-only` or
`python jobs/t<n>_*.py`.

## Reading the comparison — the one systematic divergence

The paper's DBMS is DuckDB (per-query latency ≈ 1–10 ms) on 80M–2.8B
row datasets; ours is Spark SQL (fixed per-query cost ≈ 0.5–2 s of
driver planning + scheduling + collect) on 1.5M-row laptop-scale data.
That ratio moves a constant between the systems: JoinBoost issues many
small aggregation queries per tree, so at laptop scale its absolute
times carry ~2 s × (#queries) of pure engine overhead that the paper's
setup does not have, while the library baseline's dominant cost
(materialize → export → load, linear in data size) is scaled *down*
with the data. Results that depend on *which* system performs the
work (query censuses, cache ablations, strategy orderings, memory
gates, galaxy-only capability, parallelism ablations) reproduce
cleanly; head-to-head absolute ratios against the in-memory library
shift in the library's favour by roughly that overhead constant, and we
report them unadjusted with the crossover phenomena that survive.

Substitutions (full table in DESIGN.md): LightGBM/XGBoost/Sklearn →
`repro.baselines.npgbm` (NumPy histogram GBDT, *model-parity-tested*
against the factorized trainer); LMFAO → the `batch` trainer mode
(the paper's own Fig 16a ablation definition); MADLib →
per-candidate-query trainer; Favorita/TPC-DS/IMDB → synthetic
generators of the same shape; multi-node → memory-gated baseline +
partition sweep; "LightGBM OOM" → an explicit memory-budget gate on
the estimated wide table.

---

## T1 — Random forest vs ML library (paper Fig 8a)

**Paper:** JoinBoost trains 100 trees ~3× faster than LightGBM and
finishes before LightGBM's export completes; Sklearn is so slow it is
stopped at 32 iterations; final rmse ≈ 2350, nearly identical across
systems.

**Measured:**

```
{{T1}}
```

**Shape:** final rmse is statistically identical across systems
(≈2272 vs ≈2265 — the paper's "nearly identical (~2350)" claim at our
scale). JoinBoost's early trees land before the library clears its
materialize→export→load pipeline — the materialization-free start the
paper banks on (the pipeline share of the library column is the
dominant early cost; its size varies run-to-run with disk state). The
full-forest 3× win does not carry to 8 trees at this scale: each
JoinBoost tree is 8 Spark queries ≈ 15–20 s of engine floor vs the
library's ~1 s in-memory tree over a 14 MB sample. At the paper's
80M-row scale those queries are compute-bound and the pipeline is
300+ s — the regime where the published 3× arises.

## T2 — Gradient boosting vs ML library (paper Fig 8b,c)

**Paper:** JoinBoost is ~1.1× faster than LightGBM and ~1.2× faster
than XGBoost over 100 iterations; rmse trajectories of JoinBoost and
LightGBM are *equivalent* (same algorithm); models converge ~60
iterations, by which time the libraries have only just loaded data.

**Measured:**

```
{{T2}}
```

**Shape:** the load-bearing claim reproduces exactly: the rmse
trajectories are identical column-for-column — the factorized trainer
and the in-memory library grow the *same model* over the
never-materialized join (also asserted tree-by-tree in
`tests/test_gbm.py`), the paper's Fig 8c. JoinBoost's first boosted
model arrives in the same wall-clock band as the library's 0th+1st
iteration (the pipeline cost varies 10–40 s run-to-run with disk
state); beyond that the per-iteration ratio favours the in-memory
library at this scale for the engine-floor reason above, compressing
the paper's 1.1× headline.

## T3 — Query census of one boosting iteration (paper Fig 9)

**Paper:** a tree of 8 leaves / 15 nodes issues 270 = 15×18 split
queries and 75 = 15×5 message queries; split queries take <10 ms,
message queries from the fact >200 ms.

**Measured:**

```
{{T3}}
```

**Shape:** the census reproduces *exactly* in structure: 196 split
queries (15 nodes × 13 features, +1 root-totals) and **75 = 15×5
message queries**, the paper's formula with our 13 features and 5 join
edges. The split-vs-message latency gap (paper: 20×) compresses to
~1× because Spark's fixed per-query cost (~200–300 ms here) dominates both
query kinds at this data size; the tail (max) is message-heavy as in
the paper.

## T4 — Scaling #features (paper Fig 10)

**Paper:** LightGBM slows >1.5× at 25 features and OOMs (125 GB) at
50 features; XGBoost falls back to out-of-core and takes ~4000 s;
JoinBoost scales linearly with >10× lower slope.

**Measured:**

```
{{T4}}
```

**Shape:** reproduced. JoinBoost's per-iteration time is nearly flat
in #features (5→50 features: ~1.3×) because only the dimension tables
widen; the library's cost grows ~2.7× by 30 features and the 50-feature
configuration exceeds the (scaled) memory budget — the OOM the paper
reports, via the explicit gate.

## T5 — Scaling database size (paper Fig 11)

**Paper:** both systems scale linearly in TPC-DS SF; JoinBoost's slope
is ~10× lower at iteration 10; LightGBM OOMs at SF=25.

**Measured:**

```
{{T5}}
```

**Shape:** reproduced. JoinBoost's per-iteration cost is flat across a
5× data-size range (it is engine-overhead-bound, i.e. slope ≈ 0 —
consistent with "lower slope"), while the library's pipeline grows with
data size until the largest SF trips the memory gate, reproducing the
OOM boundary.

## T6 — Multi-node scaling stand-in (paper Figs 12/13)

**Paper (Fig 12):** on 4 machines JoinBoost is >9× faster than Dask
LightGBM/XGBoost with ~5× lower slope; LightGBM OOMs at SF=40 even on
4 machines. **Paper (Fig 13):** on a cloud warehouse at TPC-DS SF=1000,
going 1→2 machines *slows* training (shuffle stage appears); 4 (6)
machines reduce time by 10% (25%).

**Measured** (no cluster available — shuffle-partition sweep on one
box; the OOM side of Fig 12 is reproduced by T5's gate):

```
{{T6}}
```

**Shape:** the Fig 13 phenomenon — parallelism buys little at modest
per-node data sizes — reproduces: the 1→16 partition sweep is nearly
flat (±15% across runs; extra fan-out can even cost, the analogue of
the paper's 1→2-machine slowdown, and the gains at 4–16 partitions are
single-digit-percent like the paper's 10%/25% at 4/6 machines). True
multi-machine speedups are out of scope on a single container.

## T7 — Galaxy schema with Clustered Predicate Trees (paper Fig 14)

**Paper:** on IMDB (1.2 GB base, `R⋈` > 1 TB) JoinBoost trains one
tree + residual update per cluster in ~5 s/iteration, scaling linearly;
ML libraries cannot run at all.

**Measured:**

```
{{T7}}
```

**Shape:** reproduced. Training proceeds over the never-materialized
M-N join (an order-of-magnitude row blow-up here) with per-iteration cost flat across
iterations; every tree is confined to one CPT cluster and residuals are
folded into that cluster's fact-table annotations
(add-to-mult-preserving ⊗, verified against a materialized oracle in
`tests/test_gbm.py`); the library baseline is gated out because the
estimated wide table exceeds the budget — "LightGBM cannot run because
the join result is >1TB" at scale.

## T8 — Residual-update strategies (paper Figs 5/15)

**Paper (Fig 5, 100M rows):** Naive is worst (join + rematerialize);
CREATE is ~2–4× faster but grows with the k payload columns; SET is
prohibitive on DBMS-X; all DBMS methods take >3 s while LightGBM's
in-memory array write takes ~0.2 s; column swap (DP/D-Swap) reaches
~0.7–1.2 s — ~15× better, competitive with LightGBM. (Fig 15: DP cuts
updates 17.8 s→1.2 s but slows training 1.6×; D-Swap keeps both fast.)

**Measured (1M rows):**

```
{{T8}}
```

**Shape:** the paper's ordering reproduces: naive ≫ create ≈ swap at
k=0, with swap ~10–15× faster than naive (paper: ~15× for column swap)
and flat in k, while create's payload-copy cost is visible but small at
1M rows (the paper's 100M-row setting makes it dominant). The in-memory array write is still ~300× faster than any
engine-mediated update — the exact gap that motivates the paper's
column-swap design. Spark DataFrames are immutable, so the paper's SET
(in-place UPDATE) has no analogue; the paper itself shows SET is
dominated. Our `swap` materializes only the slim (keys + s) projection,
the tech-report's "only s is needed" observation.

## T9 — vs LMFAO: message-caching ablation (paper Fig 16a)

**Paper:** JoinBoost trains a depth-10 tree 1.9× faster than LMFAO's
custom engine; Batch (= LMFAO's logical optimizations reimplemented:
within-node sharing only) is 3× slower than JoinBoost (cross-node
message caching) and 2× faster than Naive (materialized).

**Measured:**

```
{{T9}}
```

**Shape:** cross-node caching beats batch-only sharing (fewer message
queries, ~1.4× faster — paper: 3×; the gap narrows because on a
depth-2 star half the per-node messages are invalidated by the child
predicate anyway, and Spark's per-query floor flattens message-size
effects). All variants train the identical model. The naive row is
faster than both per-query variants *at this scale only* — each of its
queries is one cached-wide-table scan vs the message engine's several
cache/count round trips; the batched-aggregate row (JoinBoost's
production path here, the paper's "batch of group-by aggregations")
restores the factorized win over naive.

## T10 — vs MADLib (paper Fig 16b)

**Paper:** MADLib times out (>1 h) on full Favorita; on 10k rows
JoinBoost is ~16× faster.

**Measured (10k rows):**

```
{{T10}}
```

**Shape:** reproduced, same order of magnitude (~10–20× across runs;
paper: ~16×), driven by exactly the two causes the paper names — no
factorization and one aggregation query per candidate split
(281 queries vs JoinBoost's 4 batched node queries).

## T11 — Inter-query parallelism (paper Fig 18)

**Paper:** scheduling independent queries across threads cuts gradient
boosting training 28% and random forest 35% (4 intra-query threads +
the rest inter-query).

**Measured:**

```
{{T11}}
```

**Shape:** feature-level inter-query parallelism reliably cuts the
general-engine decision tree ~30–65% (paper: −28% for GB).
Tree-level RF parallelism is noisier here: Spark's *driver* (planning,
Py4J, scheduler lock) is the shared bottleneck that DuckDB's thread
pool did not have, so concurrent trees gain ~20–25% in isolated runs
but can invert under session pressure; the paper's −35% sits inside
that band.

---

## Appendix-level results covered elsewhere

* **Histogram/cuboid (Fig 20)** and TPC-H appendix runs are not
  separately harnessed; TPC-DS-lite (T5) covers the size dimension and
  the star trainer's GROUPING-SETS batching is the cuboid idea's
  degenerate (per-feature) form.
* **Model-parity** ("returns models identical to LightGBM", §5.1) is a
  *test*, not a table: `tests/test_trainer.py` / `tests/test_gbm.py`
  assert bit-identical trees across the factorized, batched-star,
  naive-materialized and NumPy engines on exact-arithmetic data.
* **Proposition 4.1 / Definition 1** are property-tested
  (`tests/test_semiring.py`, Hypothesis) and verified end-to-end on the
  galaxy path against a materialized oracle (`tests/test_gbm.py`).
