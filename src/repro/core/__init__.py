"""Sharon's primary contribution: the sharing optimizer.

Sub-modules mirror the paper's sections: ``model`` (Defs 1-2), ``ccspan``
(Alg 7), ``cost`` (Eqs 1-8), ``graph`` (Defs 6-10, Alg 1), ``gwmin``
(Alg 8, Eq 10), ``reduce`` (Alg 2), ``planner`` (Algs 3-4), ``expand``
(Algs 5-6), ``optimizer`` (the end-to-end Greedy/Exhaustive/Sharon
pipelines benchmarked in Section 8.3).
"""
