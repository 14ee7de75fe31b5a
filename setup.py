from setuptools import setup

# setup.py exists so `pip install -e .` / `python setup.py develop` work
# without the `wheel` package (PEP 660 editable builds need bdist_wheel,
# unavailable offline). Metadata lives in pyproject.toml.
setup()
