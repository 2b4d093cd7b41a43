"""Dataset substrates: the paper's worked example plus synthetic stand-ins
for the proprietary movie (Netflix x IMDB) and publication (ACM DL)
datasets (see DESIGN.md section 3 for the substitution rationale)."""
