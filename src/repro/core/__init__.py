"""Core machinery of the reproduction.

``ovc`` and ``tree_of_losers`` are the software equivalents of the CFC
and UPT mainframe instructions (paper Section 3); ``external_sort``
builds run generation and merging on top of them; ``operators`` holds
the order-preserving operators of Section 4 that consume *and produce*
offset-value codes.
"""
