"""Synthetic stand-ins for the paper's six real-world streams.

The paper's algorithms never look at raw video/text — they see only the
per-record triple ``(proxy score, oracle statistic, oracle predicate)``.
These generators produce streams matching Table 2's published predicate
positivity rates and proxy-statistic Pearson correlations, with AR(1)
temporal structure standing in for the temporal locality of real video.
"""
