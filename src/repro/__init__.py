"""PySpark reproduction of R2D2 (SIGMOD 2023, DOI 10.1145/3626762).

Subpackages:

- ``core``        — the paper's contribution: SGB, MMP, CLP, pipeline,
                    Theorem 4.2 sampling bound, §7.1 dynamic updates.
- ``lake``        — data-lake substrate: catalog, Parquet footer stats,
                    §6.1.1 synthetic lake generator.
- ``groundtruth`` — brute-force schema/content containment (§6.2).
- ``baselines``   — modified baselines of §6.4: [3]-style classifier,
                    KMeans schema clustering, LCJoin, JOSIE.
- ``optimizer``   — §5: cost model, OPT-RET ILP, Dyn-Lin, random graphs.
- ``experiments`` — harnesses reproducing evaluation Tables 1-7.
"""
