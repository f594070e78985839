"""Order-preserving operators that consume AND produce offset-value codes.

One module per subsection of paper Section 4. All operators take and
return streams of ``(key, code, payload)`` where ``code`` is the row's
ascending OVC relative to its predecessor in the *same* stream, and
derive output codes with integer arithmetic only — no column value
comparisons beyond those the operator itself needs (Section 4.11).
"""
