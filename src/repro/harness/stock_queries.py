"""The stock-market CEQL queries Q1–Q7 (paper appendix C).

Q1–Q6 are verbatim from the appendix (modulo whitespace); the appendix's
listing of Q7 is cut off in the paper, so Q7 is written from its Section 6
description: "combines disjunction and iteration, searching for a pattern of
the form SELL; (BUY OR SELL)+; SELL", with the same window/consumption
clauses as the others.
"""

Q1 = """
SELECT * FROM S
WHERE (SELL as msft; BUY as oracle; BUY as csco; SELL as amat)
FILTER msft[name = 'MSFT'] AND oracle[name = 'ORCL'] AND
csco[name = 'CSCO'] AND amat[name = 'AMAT']
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

Q2 = """
SELECT * FROM S
WHERE (SELL as msft; BUY as oracle; BUY as csco; SELL as amat)
FILTER msft[name = 'MSFT'] AND msft[price > 26.0] AND
oracle[name = 'ORCL'] AND oracle[price > 11.14] AND
csco[name = 'CSCO'] AND amat[name = 'AMAT'] AND amat[price >= 18.92]
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

Q3 = """
SELECT * FROM S
WHERE (SELL as msft; BUY as oracle; BUY as csco; SELL as amat)
FILTER msft[name = 'MSFT'] AND oracle[name = 'ORCL'] AND
csco[name = 'CSCO'] AND amat[name = 'AMAT']
PARTITION BY [volume]
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

Q4 = """
SELECT * FROM S
WHERE (SELL as msft; (BUY OR SELL) as oracle; (BUY OR SELL) as csco; SELL as amat)
FILTER msft[name = 'MSFT'] AND oracle[name = 'ORCL'] AND
csco[name = 'CSCO'] AND amat[name = 'AMAT']
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

Q5 = """
SELECT * FROM S
WHERE (SELL as msft; (BUY OR SELL) as oracle; (BUY OR SELL) as csco; SELL as amat)
FILTER msft[name = 'MSFT'] AND msft[price > 26.0] AND
oracle[name = 'ORCL'] AND oracle[price > 11.14] AND
csco[name = 'CSCO'] AND amat[name = 'AMAT'] AND amat[price >= 18.92]
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

Q6 = """
SELECT * FROM S
WHERE (SELL as msft; (BUY OR SELL) as oracle; (BUY OR SELL) as csco; SELL as amat)
FILTER msft[name = 'MSFT'] AND oracle[name = 'ORCL'] AND
csco[name = 'CSCO'] AND amat[name = 'AMAT']
PARTITION BY [volume]
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

Q7 = """
SELECT * FROM S
WHERE (SELL as first; (BUY OR SELL)+ as mid; SELL as last)
FILTER first[name = 'MSFT'] AND last[name = 'MSFT']
WITHIN 30000 [stock_time]
CONSUME BY ANY
"""

STOCK_QUERIES = {
    "Q1": Q1,
    "Q2": Q2,
    "Q3": Q3,
    "Q4": Q4,
    "Q5": Q5,
    "Q6": Q6,
    "Q7": Q7,
}
