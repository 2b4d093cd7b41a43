"""The paper's contribution: shared-computation Pareto-frontier monitoring.

Modules: dominance kernels, Baseline (Alg.1), common preference relations
(Def.5), FilterThenVerify (Alg.2), similarity functions (Eqs.2-6), HAC
clustering (Def.7), GetApproxPreferenceTuples (Alg.3), sliding-window
engines (Algs.4-5), efficacy metrics (Eqs.7-9)."""
