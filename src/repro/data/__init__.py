"""Dataset substrates for the reproduction.

The paper evaluates on UCI Higgs (11M x 7), UCI Power (2M x 7), and a
word2vec embedding of English Wikipedia (5.5M x 50). None of those are
available offline, so ``datasets`` provides synthetic substitutes with the
same dimensionality and qualitative structure, plus the paper's outlier
injection (Section 5.2) and SMOTE-like inflation (Section 5.3) procedures.
"""
from repro.data import datasets  # noqa: F401
