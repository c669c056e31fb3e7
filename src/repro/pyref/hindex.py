"""Reference H-index (ℋ) computation (Hirsch index over a multiset)."""


def h_index(values):
    """``ℋ(S)``: the largest ``y`` such that at least ``y`` members of
    ``S`` are ``>= y``. ``ℋ(∅) = 0``.

    Direct definition: sort descending; the answer is the number of
    prefix positions ``i`` (1-based) whose value is ``>= i``.
    """
    vs = sorted(values, reverse=True)
    h = 0
    for i, v in enumerate(vs, start=1):
        if v >= i:
            h = i
        else:
            break
    return h
