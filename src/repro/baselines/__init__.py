"""Competitor algorithms outside the paper's framework: the adapted
k-shortest-path baselines DkSP and OnePass used in Exp-6."""
