"""The paper's contribution: two-phase, cost-based CQ evaluation —
answer-graph generation (factorization) and defactorization."""
