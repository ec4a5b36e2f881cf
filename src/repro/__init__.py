"""PySpark reproduction of "Answer Graph: Factorization Matters in Large
Graphs" (EDBT 2021): factorized answer-graph evaluation of SPARQL
conjunctive queries with cost-based planning, plus the substrates
(synthetic YAGO2s-lite RDF data, Parquet triple store, statistics
catalog) and the baseline evaluators Table 1 compares against.
See DESIGN.md for the architecture map."""
